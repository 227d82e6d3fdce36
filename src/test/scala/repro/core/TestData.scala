package repro.core

import scala.util.Random

/** Small deterministic Gaussian mixtures for unit tests. */
object TestData {
  def mixture(n: Int, d: Int, g: Int, sd: Double, seed: Long): Array[Array[Double]] = {
    val rnd = new Random(seed)
    val centers = Array.fill(g, d)(rnd.nextDouble())
    Array.fill(n) {
      val c = centers(rnd.nextInt(g))
      Array.tabulate(d)(i => c(i) + rnd.nextGaussian() * sd)
    }
  }

  def uniform(n: Int, d: Int, seed: Long): Array[Array[Double]] = {
    val rnd = new Random(seed)
    Array.fill(n)(Array.fill(d)(rnd.nextDouble()))
  }
}
