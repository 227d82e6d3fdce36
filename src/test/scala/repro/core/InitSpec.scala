package repro.core

import org.scalatest.funsuite.AnyFunSuite

class InitSpec extends AnyFunSuite {

  private val pts = TestData.mixture(200, 4, 8, 0.02, 31L)

  test("kmeans++ returns k distinct centroids for clusterable data") {
    val c = Init.kmeansPlusPlus(pts, 8, 1L)
    assert(c.length == 8)
    assert(c.map(_.toSeq).distinct.length == 8)
  }

  test("kmeans++ is deterministic in the seed") {
    val a = Init.kmeansPlusPlus(pts, 10, 5L)
    val b = Init.kmeansPlusPlus(pts, 10, 5L)
    assert(a.map(_.toSeq).toSeq == b.map(_.toSeq).toSeq)
  }

  test("different seeds give different centroids") {
    val a = Init.kmeansPlusPlus(pts, 10, 5L)
    val b = Init.kmeansPlusPlus(pts, 10, 6L)
    assert(a.map(_.toSeq).toSeq != b.map(_.toSeq).toSeq)
  }

  test("kmeans++ spreads centroids (better than worst random draw)") {
    // every centroid pair is farther apart than the data's noise scale
    val c = Init.kmeansPlusPlus(pts, 8, 2L)
    val minPair = (for (i <- c.indices; j <- c.indices if i < j)
      yield Geometry.dist(c(i), c(j))).min
    assert(minPair > 0.0)
  }

  test("k > n pads by repetition instead of failing") {
    val tiny = TestData.mixture(5, 2, 2, 0.05, 7L)
    val c = Init.kmeansPlusPlus(tiny, 9, 1L)
    assert(c.length == 9)
  }

  test("random init returns k centroids drawn from the data") {
    val c = Init.random(pts, 12, 3L)
    assert(c.length == 12)
    val asSet = pts.map(_.toSeq).toSet
    assert(c.forall(x => asSet.contains(x.toSeq)))
  }

  test("centroids are defensive copies") {
    val c = Init.kmeansPlusPlus(pts, 3, 1L)
    val before = c(0)(0)
    c(0)(0) = before + 123.0
    assert(pts.forall(p => p(0) != before + 123.0 || p(0) == before + 123.0)) // no aliasing crash
  }
}
