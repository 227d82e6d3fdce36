package repro.core

/** Low-level vector math used by every kernel. Hot-path methods are
  * `while`-loop implementations over `Array[Double]` so the JIT can
  * vectorize them; no allocation inside loops.
  */
object Geometry {

  /** Euclidean distance ‖a−b‖. */
  def dist(a: Array[Double], b: Array[Double]): Double = math.sqrt(distSq(a, b))

  /** Squared Euclidean distance ‖a−b‖². */
  def distSq(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0
    var i = 0
    val n = a.length
    while (i < n) { val t = a(i) - b(i); s += t * t; i += 1 }
    s
  }

  /** L2 norm ‖a‖. */
  def norm(a: Array[Double]): Double = {
    var s = 0.0
    var i = 0
    while (i < a.length) { s += a(i) * a(i); i += 1 }
    math.sqrt(s)
  }

  /** In-place `acc += x`. */
  def addTo(acc: Array[Double], x: Array[Double]): Unit = {
    var i = 0
    while (i < acc.length) { acc(i) += x(i); i += 1 }
  }

  /** In-place `acc -= x`. */
  def subFrom(acc: Array[Double], x: Array[Double]): Unit = {
    var i = 0
    while (i < acc.length) { acc(i) -= x(i); i += 1 }
  }

  /** Fresh copy of a k×d matrix. */
  def copy2(m: Array[Array[Double]]): Array[Array[Double]] = m.map(_.clone)

  /** Block norms for the Block-Vector bound [Bottesch et al.]: the vector is
    * split into two halves and we return (‖first half‖, ‖second half‖).
    * By per-block Cauchy-Schwarz, ⟨x,c⟩ ≤ ‖x₁‖‖c₁‖ + ‖x₂‖‖c₂‖, giving the
    * valid lower bound sqrt(‖x‖²+‖c‖²−2(‖x₁‖‖c₁‖+‖x₂‖‖c₂‖)) ≤ ‖x−c‖.
    */
  def blockNorms(a: Array[Double]): (Double, Double) = {
    val h = a.length / 2
    var s1 = 0.0; var s2 = 0.0
    var i = 0
    while (i < h) { s1 += a(i) * a(i); i += 1 }
    while (i < a.length) { s2 += a(i) * a(i); i += 1 }
    (math.sqrt(s1), math.sqrt(s2))
  }

  /** Block-vector lower bound on ‖x−c‖ from precomputed norms. */
  def blockLb(xNormSq: Double, xB1: Double, xB2: Double,
              cNormSq: Double, cB1: Double, cB2: Double): Double = {
    val ip = xB1 * cB1 + xB2 * cB2
    val v  = xNormSq + cNormSq - 2.0 * ip
    if (v <= 0.0) 0.0 else math.sqrt(v)
  }
}
