package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.index.KdKMeans
import repro.unik.{UniKMode, UniKStrategy}

/** Degenerate inputs every kernel must survive: k=1, k close to n,
  * duplicate points (empty clusters), and early convergence.
  */
class EdgeCaseSpec extends AnyFunSuite {

  private val strategies: Seq[Strategy] =
    Strategies.sequential ++ Seq(Strategies.index, KdKMeans, Strategies.full,
      new UniKStrategy(UniKMode.Adaptive), new UniKStrategy(UniKMode.Single),
      new UniKStrategy(UniKMode.Multiple))

  private def sseOf(s: Strategy, pts: Array[Array[Double]], k: Int, seed: Long): FitResult = {
    val init = Init.kmeansPlusPlus(pts, k, seed)
    Runner.fitLocal(s, pts, k, init, maxIters = 10)
  }

  for (s <- strategies) {
    test(s"${s.name} handles k=1") {
      val pts = TestData.mixture(120, 3, 4, 0.05, 7L)
      val ref = sseOf(LloydKernel, pts, 1, 9L)
      val res = sseOf(s, pts, 1, 9L)
      assert(math.abs(res.sse - ref.sse) / math.max(ref.sse, 1e-12) < 1e-6)
    }

    test(s"${s.name} handles k close to n") {
      val pts = TestData.mixture(40, 2, 4, 0.05, 8L)
      val ref = sseOf(LloydKernel, pts, 35, 9L)
      val res = sseOf(s, pts, 35, 9L)
      assert(math.abs(res.sse - ref.sse) / math.max(ref.sse, 1e-9) < 1e-6)
    }

    test(s"${s.name} handles duplicate points") {
      val base = TestData.mixture(30, 2, 3, 0.05, 9L)
      val pts = Array.tabulate(90)(i => base(i % 30).clone)
      val ref = sseOf(LloydKernel, pts, 10, 9L)
      val res = sseOf(s, pts, 10, 9L)
      assert(math.abs(res.sse - ref.sse) / math.max(ref.sse, 1e-9) < 1e-6)
    }

    test(s"${s.name} converges early on trivially separated data") {
      val pts = (0 until 60).map { i =>
        val c = i % 3
        Array(c * 100.0 + (i % 7) * 0.001, c * 100.0)
      }.toArray
      val res = sseOf(s, pts, 3, 10L)
      assert(res.converged, "should reach a fixed point within 10 iterations")
      assert(res.iterations < 10)
    }
  }
}
