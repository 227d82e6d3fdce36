package repro.tune

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** The from-scratch classifiers must separate what is separable. */
class ModelsSpec extends AnyFunSuite {

  /** Three Gaussian blobs in 4-d, labels = blob id. */
  private def blobs(n: Int, seed: Long): (Array[Array[Double]], Array[Int]) = {
    val rnd = new Random(seed)
    val centers = Array(Array(0.0, 0.0, 0.0, 0.0), Array(5.0, 5.0, 0.0, 0.0),
      Array(0.0, 5.0, 5.0, 0.0))
    val x = new Array[Array[Double]](n)
    val y = new Array[Int](n)
    for (i <- 0 until n) {
      val c = rnd.nextInt(3)
      x(i) = centers(c).map(_ + rnd.nextGaussian() * 0.4)
      y(i) = c
    }
    (x, y)
  }

  private def accuracy(m: Model, x: Array[Array[Double]], y: Array[Int]): Double =
    x.indices.count(i => m.predict(x(i)) == y(i)).toDouble / x.length

  for (model <- Models.fresh()) {
    test(s"${model.name} separates Gaussian blobs (train accuracy > 0.9)") {
      val (x, y) = blobs(300, 61L)
      model.fit(x, y, 3)
      assert(accuracy(model, x, y) > 0.9, s"${model.name} failed on separable data")
    }

    test(s"${model.name} generalizes to held-out blobs (> 0.85)") {
      val (xt, yt) = blobs(300, 62L)
      val (xv, yv) = blobs(150, 63L)
      model.fit(xt, yt, 3)
      assert(accuracy(model, xv, yv) > 0.85)
    }
  }

  test("DecisionTree learns an axis-aligned rule exactly") {
    val x = Array.tabulate(100)(i => Array(i.toDouble, 0.0))
    val y = x.map(r => if (r(0) < 50) 0 else 1)
    val dt = new DecisionTree()
    dt.fit(x, y, 2)
    assert(accuracy(dt, x, y) == 1.0)
  }

  test("DecisionTree depth limit produces a majority leaf") {
    val x = Array.tabulate(10)(i => Array(i.toDouble))
    val y = Array(0, 0, 0, 0, 0, 0, 0, 1, 1, 1)
    val dt = new DecisionTree(maxDepth = 0)
    dt.fit(x, y, 2)
    assert(x.indices.forall(i => dt.predict(x(i)) == 0))
  }

  test("RandomForest is deterministic in its seed") {
    val (x, y) = blobs(200, 64L)
    val a = new RandomForest(nTrees = 10, seed = 3L); a.fit(x, y, 3)
    val b = new RandomForest(nTrees = 10, seed = 3L); b.fit(x, y, 3)
    assert(x.indices.forall(i => a.predict(x(i)) == b.predict(x(i))))
  }

  test("KNN on a single-class problem predicts that class") {
    val x = Array.fill(20)(Array(1.0, 2.0))
    val y = Array.fill(20)(1)
    val knn = new KNN()
    knn.fit(x, y, 2)
    assert(knn.predict(Array(1.1, 2.1)) == 1)
  }

  test("RidgeClassifier solves a deterministic linear system") {
    // y = 1 iff x0 + x1 > 1 with well-spread points: linearly separable
    val rnd = new Random(65L)
    val x = Array.fill(200)(Array(rnd.nextDouble() * 2, rnd.nextDouble() * 2))
    val y = x.map(r => if (r(0) + r(1) > 2.0) 1 else 0)
    val rc = new RidgeClassifier(lambda = 0.01)
    rc.fit(x, y, 2)
    assert(accuracy(rc, x, y) > 0.9)
  }

  test("BasicDecisionTree applies its fixed rule verbatim") {
    val bdt = new BasicDecisionTree(f => if (f(0) > 0) 1 else 0)
    bdt.fit(Array(Array(0.0)), Array(0), 2) // no-op
    assert(bdt.predict(Array(1.0)) == 1)
    assert(bdt.predict(Array(-1.0)) == 0)
  }

  test("MRR: perfect predictions score 1, worst rank scores 1/m") {
    val truth = Seq(Seq(0, 1, 2), Seq(2, 1, 0))
    assert(UTune.mrr(Seq(0, 2), truth) == 1.0)
    assert(math.abs(UTune.mrr(Seq(2, 0), truth) - (1.0 / 3)) < 1e-12)
    assert(math.abs(UTune.mrr(Seq(1, 1), truth) - 0.5) < 1e-12)
  }

  test("MRR of an unranked prediction is 0") {
    assert(UTune.mrr(Seq(7), Seq(Seq(0, 1))) == 0.0)
  }
}
