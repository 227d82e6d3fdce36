package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.index.KdKMeans
import repro.unik.{UniKMode, UniKStrategy}

/** The paper's central invariant: every accelerated method is an EXACT
  * drop-in for Lloyd's algorithm. For every kernel × workload we check
  * (a) the iteration-1 assignment matches Lloyd's exactly and (b) the
  * 10-iteration SSE and centroids agree within floating-point tolerance
  * (refinement summation order differs between full-rescan and the
  * incremental sum-vector path).
  */
class ExactnessSpec extends AnyFunSuite {

  private case class Config(n: Int, d: Int, g: Int, sd: Double, k: Int, seed: Long)

  private val configs = Seq(
    Config(300, 2, 10, 0.03, 8, 1L),
    Config(500, 5, 12, 0.05, 20, 2L),
    Config(400, 16, 8, 0.08, 25, 3L),
    Config(250, 3, 5, 0.20, 3, 4L),   // diffuse, barely clustered
    Config(300, 8, 15, 0.02, 50, 5L), // k comparable to cluster count
    Config(200, 1, 6, 0.04, 7, 6L)    // 1-dimensional
  )

  private val strategies: Seq[Strategy] =
    Strategies.sequential ++ Seq(
      Strategies.index, KdKMeans, Strategies.full,
      new UniKStrategy(UniKMode.Adaptive), new UniKStrategy(UniKMode.Single),
      new UniKStrategy(UniKMode.Multiple))

  private def lloydRef(pts: Array[Array[Double]], k: Int,
                       init: Array[Array[Double]], iters: Int) = {
    val state = LloydKernel.newState(pts, k, 0L)
    val res = Runner.fitStates(LloydKernel, Seq(state), ps => ps.head.step(_: CentroidInfo),
      k, init, iters, 0L)
    (res, state.assignments)
  }

  for (cfg <- configs) {
    val pts = TestData.mixture(cfg.n, cfg.d, cfg.g, cfg.sd, cfg.seed)
    val init = Init.kmeansPlusPlus(pts, cfg.k, cfg.seed + 100)
    lazy val (ref10, _) = lloydRef(pts, cfg.k, init, 10)
    lazy val (_, refAssign1) = lloydRef(pts, cfg.k, init, 1)

    for (s <- strategies) {
      test(s"${s.name} matches Lloyd after 1 iteration on n=${cfg.n} d=${cfg.d} k=${cfg.k}") {
        val state = s.newState(pts, cfg.k, 0L)
        Runner.fitStates(s, Seq(state), ps => ps.head.step(_: CentroidInfo),
          cfg.k, init, 1, 0L)
        assert(state.assignments.toSeq == refAssign1.toSeq,
          s"iteration-1 assignment diverges from Lloyd")
      }

      test(s"${s.name} matches Lloyd SSE after 10 iterations on n=${cfg.n} d=${cfg.d} k=${cfg.k}") {
        val res = Runner.fitLocal(s, pts, cfg.k, init, maxIters = 10)
        val rel = math.abs(res.sse - ref10.sse) / math.max(ref10.sse, 1e-12)
        assert(rel < 1e-6, s"SSE ${res.sse} vs Lloyd ${ref10.sse} (rel $rel)")
        assert(res.iterations == ref10.iterations,
          s"iterations ${res.iterations} vs Lloyd ${ref10.iterations}")
      }
    }
  }
}
