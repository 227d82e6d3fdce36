package repro.data

import org.scalatest.funsuite.AnyFunSuite

class DatasetsSpec extends AnyFunSuite {

  test("catalog mirrors the paper's Table 2 plus the three unseen sets") {
    assert(Datasets.all.length == 15)
    assert(Datasets.all.count(_.holdout) == 3)
    assert(Datasets.byName.contains("BigCross") && Datasets.byName.contains("Mnist"))
  }

  for (spec <- Datasets.all) {
    test(s"${spec.name}: generation is deterministic and correctly shaped") {
      val a = Datasets.generate(spec, frac = 0.1)
      val b = Datasets.generate(spec, frac = 0.1)
      assert(a.length == b.length)
      assert(a.length >= 32)
      assert(a(0).length == spec.d)
      assert(a(0).toSeq == b(0).toSeq && a.last.toSeq == b.last.toSeq)
    }
  }

  test("frac subsamples and dKeep projects") {
    val spec = Datasets.byName("Kegg")
    val full = Datasets.generate(spec)
    val half = Datasets.generate(spec, frac = 0.5)
    val proj = Datasets.generate(spec, dKeep = 10)
    assert(math.abs(half.length - full.length / 2) <= 1)
    assert(proj(0).length == 10)
  }

  test("different datasets differ") {
    val a = Datasets.generate(Datasets.byName("Skin"), frac = 0.05)
    val b = Datasets.generate(Datasets.byName("Road"), frac = 0.05)
    assert(a(0).toSeq != b(0).toSeq)
  }

  test("tight spatial sets really are tighter than diffuse ones") {
    import repro.core.Geometry
    def meanNN(pts: Array[Array[Double]]): Double = {
      val s = pts.take(200)
      s.map { p =>
        s.filter(_ ne p).map(q => Geometry.dist(p, q)).min
      }.sum / s.length
    }
    val nyc = Datasets.generate(Datasets.byName("NYC"), frac = 0.05)
    val power = Datasets.generate(Datasets.byName("Power"), frac = 0.05)
    // dimension-normalized nearest-neighbour spacing
    assert(meanNN(nyc) / math.sqrt(2) < meanNN(power) / math.sqrt(9))
  }
}
