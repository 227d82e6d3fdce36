package repro.tune

import org.scalatest.funsuite.AnyFunSuite
import repro.core.TestData
import repro.index.BallTree

class FeaturesSpec extends AnyFunSuite {

  private val pts = TestData.mixture(600, 6, 10, 0.03, 71L)
  private val tree = BallTree.build(pts)

  test("feature vector has the Table-1 layout") {
    val f = Features.extract(pts.length, 50, 6, tree)
    assert(f.length == Features.allNames.length)
    assert(Features.basicSlice.end == 3)
    assert(Features.treeSlice.end == 8)
    assert(Features.leafSlice.end == f.length)
  }

  test("features are deterministic") {
    val a = Features.extract(pts.length, 50, 6, tree)
    val b = Features.extract(pts.length, 50, 6, BallTree.build(pts))
    assert(a.toSeq == b.toSeq)
  }

  test("normalized leaf features are bounded") {
    val f = Features.extract(pts.length, 50, 6, tree)
    // radius and ψ are normalized by the root radius: within [0, ~2]
    assert(f(8) >= 0.0 && f(8) <= 2.0)  // muR
    assert(f(10) >= 0.0 && f(10) <= 2.0) // muPsi
  }

  test("k changes only the k feature") {
    val a = Features.extract(pts.length, 10, 6, tree)
    val b = Features.extract(pts.length, 100, 6, tree)
    assert(a(1) != b(1))
    assert(a.zipWithIndex.filter(_._2 != 1).map(_._1).toSeq ==
      b.zipWithIndex.filter(_._2 != 1).map(_._1).toSeq)
  }

  test("a tightly clustered set has smaller mean leaf radius than uniform noise") {
    val tight = TestData.mixture(600, 4, 20, 0.005, 72L)
    val loose = TestData.uniform(600, 4, 73L)
    val fTight = Features.extract(600, 10, 4, BallTree.build(tight))
    val fLoose = Features.extract(600, 10, 4, BallTree.build(loose))
    assert(fTight(8) < fLoose(8), "muR should reflect assembledness")
  }
}
