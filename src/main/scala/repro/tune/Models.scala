package repro.tune

import scala.util.Random

/** Multi-class classifiers implemented from scratch (the paper uses
  * scikit-learn; the container has no Python, and training sets here are a
  * few hundred rows × 14 features, where these textbook implementations
  * are entirely adequate). Each reports its training/prediction wall time
  * for the Table-7 reproduction.
  */
trait Model {
  def name: String
  def fit(x: Array[Array[Double]], y: Array[Int], nClasses: Int): Unit
  def predict(x: Array[Double]): Int
}

/** CART decision tree with Gini impurity (paper: depth 10). */
final class DecisionTree(maxDepth: Int = 10, minLeaf: Int = 1) extends Model {
  val name = "DT"
  private sealed trait Node
  private final case class Leaf(label: Int) extends Node
  private final case class Split(feat: Int, thr: Double, lo: Node, hi: Node) extends Node
  private var root: Node = Leaf(0)

  def fit(x: Array[Array[Double]], y: Array[Int], nClasses: Int): Unit = {
    root = grow(x.indices.toArray, x, y, nClasses, maxDepth, None)
  }

  /** Restrict candidate split features (used by RandomForest bags). */
  def fitWithFeatures(x: Array[Array[Double]], y: Array[Int], nClasses: Int,
                      feats: Array[Int]): Unit = {
    root = grow(x.indices.toArray, x, y, nClasses, maxDepth, Some(feats))
  }

  private def majority(idx: Array[Int], y: Array[Int], nClasses: Int): Int = {
    val cnt = new Array[Int](nClasses)
    idx.foreach(i => cnt(y(i)) += 1)
    cnt.indices.maxBy(cnt)
  }

  private def gini(cnt: Array[Int], tot: Int): Double = {
    if (tot == 0) 0.0
    else 1.0 - cnt.map(c => { val p = c.toDouble / tot; p * p }).sum
  }

  private def grow(idx: Array[Int], x: Array[Array[Double]], y: Array[Int],
                   nClasses: Int, depth: Int, feats: Option[Array[Int]]): Node = {
    val label = majority(idx, y, nClasses)
    if (depth == 0 || idx.length <= minLeaf || idx.map(y).distinct.length == 1)
      return Leaf(label)
    val nf = x(0).length
    val candFeats = feats.getOrElse(Array.tabulate(nf)(identity))
    var bestGain = 0.0; var bestFeat = -1; var bestThr = 0.0
    val totalCnt = new Array[Int](nClasses)
    idx.foreach(i => totalCnt(y(i)) += 1)
    val parentGini = gini(totalCnt, idx.length)
    candFeats.foreach { f =>
      val sorted = idx.sortBy(x(_)(f))
      val loCnt = new Array[Int](nClasses)
      var z = 0
      while (z < sorted.length - 1) {
        loCnt(y(sorted(z))) += 1
        if (x(sorted(z))(f) < x(sorted(z + 1))(f)) {
          val nLo = z + 1; val nHi = sorted.length - nLo
          val hiCnt = Array.tabulate(nClasses)(c => totalCnt(c) - loCnt(c))
          val g = parentGini -
            (nLo * gini(loCnt, nLo) + nHi * gini(hiCnt, nHi)) / sorted.length
          if (g > bestGain) {
            bestGain = g; bestFeat = f
            bestThr = 0.5 * (x(sorted(z))(f) + x(sorted(z + 1))(f))
          }
        }
        z += 1
      }
    }
    if (bestFeat < 0) Leaf(label)
    else {
      val (lo, hi) = idx.partition(x(_)(bestFeat) <= bestThr)
      if (lo.isEmpty || hi.isEmpty) Leaf(label)
      else Split(bestFeat, bestThr,
        grow(lo, x, y, nClasses, depth - 1, feats),
        grow(hi, x, y, nClasses, depth - 1, feats))
    }
  }

  def predict(x: Array[Double]): Int = {
    var nd = root
    while (true) {
      nd match {
        case Leaf(l) => return l
        case Split(f, thr, lo, hi) => nd = if (x(f) <= thr) lo else hi
      }
    }
    0
  }
}

/** Bagged random forest over depth-limited CART trees with √f feature bags. */
final class RandomForest(nTrees: Int = 50, maxDepth: Int = 10, seed: Long = 5L) extends Model {
  val name = "RF"
  private val trees = new scala.collection.mutable.ArrayBuffer[DecisionTree]
  private val featSets = new scala.collection.mutable.ArrayBuffer[Array[Int]]
  private var nCls = 2

  def fit(x: Array[Array[Double]], y: Array[Int], nClasses: Int): Unit = {
    trees.clear(); featSets.clear()
    nCls = nClasses
    val rnd = new Random(seed)
    val nf = x(0).length
    val bag = math.max(1, math.sqrt(nf.toDouble).round.toInt)
    var z = 0
    while (z < nTrees) {
      val idx = Array.fill(x.length)(rnd.nextInt(x.length))
      val feats = rnd.shuffle((0 until nf).toList).take(bag).toArray
      val xs = idx.map(x); val ys = idx.map(y)
      val t = new DecisionTree(maxDepth)
      // grow on the bootstrap sample restricted to the feature bag
      t.fitWithFeatures(xs, ys, nClasses, feats)
      trees += t; featSets += feats
      z += 1
    }
  }

  def predict(x: Array[Double]): Int = {
    val votes = new Array[Int](nCls)
    trees.foreach(t => votes(t.predict(x)) += 1)
    votes.indices.maxBy(votes)
  }
}

/** z-scored k-nearest-neighbour voting (k = 5). */
final class KNN(kNeighbors: Int = 5) extends Model {
  val name = "kNN"
  private var xs: Array[Array[Double]] = Array.empty
  private var ys: Array[Int] = Array.empty
  private var mu: Array[Double] = Array.empty
  private var sd: Array[Double] = Array.empty
  private var nCls = 2

  def fit(x: Array[Array[Double]], y: Array[Int], nClasses: Int): Unit = {
    nCls = nClasses
    val nf = x(0).length
    mu = Array.tabulate(nf)(f => x.map(_(f)).sum / x.length)
    sd = Array.tabulate(nf) { f =>
      val v = x.map(r => (r(f) - mu(f)) * (r(f) - mu(f))).sum / x.length
      val s = math.sqrt(v); if (s == 0) 1.0 else s
    }
    xs = x.map(norm); ys = y.clone()
  }

  private def norm(r: Array[Double]): Array[Double] =
    Array.tabulate(r.length)(f => (r(f) - mu(f)) / sd(f))

  def predict(x: Array[Double]): Int = {
    val q = norm(x)
    val dists = xs.indices.map(i => (repro.core.Geometry.distSq(q, xs(i)), ys(i)))
    val votes = new Array[Int](nCls)
    dists.sortBy(_._1).take(kNeighbors).foreach(p => votes(p._2) += 1)
    votes.indices.maxBy(votes)
  }
}

/** One-vs-rest ridge regression classifier (closed form via Gaussian
  * elimination on the 14×14 normal equations).
  */
final class RidgeClassifier(lambda: Double = 1.0) extends Model {
  val name = "RC"
  private var w: Array[Array[Double]] = Array.empty // class → weights (+bias)

  def fit(x: Array[Array[Double]], y: Array[Int], nClasses: Int): Unit = {
    val nf = x(0).length + 1 // bias
    val xa = x.map(r => r :+ 1.0)
    val xtx = Array.ofDim[Double](nf, nf)
    for (r <- xa; i <- 0 until nf; j <- 0 until nf) xtx(i)(j) += r(i) * r(j)
    for (i <- 0 until nf) xtx(i)(i) += lambda
    w = Array.tabulate(nClasses) { c =>
      val xty = new Array[Double](nf)
      xa.indices.foreach { z =>
        val t = if (y(z) == c) 1.0 else -1.0
        for (i <- 0 until nf) xty(i) += xa(z)(i) * t
      }
      solve(xtx.map(_.clone), xty.clone)
    }
  }

  private def solve(a: Array[Array[Double]], b: Array[Double]): Array[Double] = {
    val nf = b.length
    for (col <- 0 until nf) {
      var piv = col
      for (r <- col + 1 until nf) if (math.abs(a(r)(col)) > math.abs(a(piv)(col))) piv = r
      val tmp = a(col); a(col) = a(piv); a(piv) = tmp
      val tb = b(col); b(col) = b(piv); b(piv) = tb
      val diag = a(col)(col)
      if (math.abs(diag) > 1e-12) {
        for (r <- col + 1 until nf) {
          val fac = a(r)(col) / diag
          for (c2 <- col until nf) a(r)(c2) -= fac * a(col)(c2)
          b(r) -= fac * b(col)
        }
      }
    }
    val out = new Array[Double](nf)
    for (r <- (0 until nf).reverse) {
      var s = b(r)
      for (c2 <- r + 1 until nf) s -= a(r)(c2) * out(c2)
      out(r) = if (math.abs(a(r)(r)) > 1e-12) s / a(r)(r) else 0.0
    }
    out
  }

  def predict(x: Array[Double]): Int = {
    val xa = x :+ 1.0
    w.indices.maxBy(c => (0 until xa.length).map(i => w(c)(i) * xa(i)).sum)
  }
}

/** One-vs-rest linear SVM trained with Pegasos SGD on z-scored features. */
final class LinearSVM(lambda: Double = 1e-3, epochs: Int = 200, seed: Long = 9L) extends Model {
  val name = "SVM"
  private var w: Array[Array[Double]] = Array.empty
  private var mu: Array[Double] = Array.empty
  private var sd: Array[Double] = Array.empty

  def fit(x: Array[Array[Double]], y: Array[Int], nClasses: Int): Unit = {
    val nf = x(0).length
    mu = Array.tabulate(nf)(f => x.map(_(f)).sum / x.length)
    sd = Array.tabulate(nf) { f =>
      val v = x.map(r => (r(f) - mu(f)) * (r(f) - mu(f))).sum / x.length
      val s = math.sqrt(v); if (s == 0) 1.0 else s
    }
    val xs = x.map(r => Array.tabulate(nf)(f => (r(f) - mu(f)) / sd(f)) :+ 1.0)
    val rnd = new Random(seed)
    w = Array.tabulate(nClasses) { c =>
      val wc = new Array[Double](nf + 1)
      var step = 1
      for (_ <- 0 until epochs; _ <- xs.indices) {
        val i = rnd.nextInt(xs.length)
        val t = if (y(i) == c) 1.0 else -1.0
        val eta = 1.0 / (lambda * step)
        val margin = t * dot(wc, xs(i))
        for (f <- wc.indices) wc(f) *= (1.0 - eta * lambda)
        if (margin < 1.0) for (f <- wc.indices) wc(f) += eta * t * xs(i)(f)
        step += 1
      }
      wc
    }
  }

  private def dot(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }

  def predict(x: Array[Double]): Int = {
    val q = Array.tabulate(x.length)(f => (x(f) - mu(f)) / sd(f)) :+ 1.0
    w.indices.maxBy(c => dot(w(c), q))
  }
}

/** The paper's Figure-5 rule-of-thumb Basic Decision Tree: index for d < 20,
  * otherwise Yinyang for large k, else Hame. Class label mapping is
  * supplied by the caller (labels differ between the bound and index tasks).
  */
final class BasicDecisionTree(rule: Array[Double] => Int) extends Model {
  val name = "BDT"
  def fit(x: Array[Array[Double]], y: Array[Int], nClasses: Int): Unit = ()
  def predict(x: Array[Double]): Int = rule(x)
}

object Models {
  /** Fresh instances per training task (models are stateful). */
  def fresh(): Seq[Model] =
    Seq(new DecisionTree(), new RandomForest(), new LinearSVM(), new KNN(), new RidgeClassifier())
}
