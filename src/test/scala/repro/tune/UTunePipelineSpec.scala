package repro.tune

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Strategies
import repro.data.Datasets

/** End-to-end check of ground-truth generation, task assembly, model
  * training, and strategy prediction on a miniature grid.
  */
class UTunePipelineSpec extends AnyFunSuite {

  // Tiny but real: 4 datasets × 2 k values, selective running, 3 iterations.
  private lazy val records: Seq[EvalRecord] =
    for {
      name <- Seq("Skin", "NYC", "Kegg", "Power")
      k <- Seq(10, 30)
    } yield EvalHarness.runSelective(Datasets.byName(name), frac = 0.12, dKeep = -1,
      k = k, tmax = 3)

  test("selective records carry pool times and at least labels 1 and 2") {
    records.foreach { r =>
      assert(r.seqTimes.keySet == EvalHarness.poolNames.toSet)
      assert(r.indexTimes.contains(1) && r.indexTimes.contains(2))
      assert(r.features.length == Features.allNames.length)
    }
  }

  test("boundRank is a permutation of the pool sorted by time") {
    records.foreach { r =>
      assert(r.boundRank.sorted == EvalHarness.poolNames.sorted)
      assert(r.boundRank.map(r.seqTimes) == r.boundRank.map(r.seqTimes).sorted)
    }
  }

  test("indexRank always ranks all four labels") {
    records.foreach(r => assert(r.indexRank.sorted == Seq(1, 2, 3, 4)))
  }

  test("bound/index tasks have consistent shapes") {
    val b = UTune.boundTask(records, Features.leafSlice)
    val i = UTune.indexTask(records, Features.basicSlice)
    assert(b.x.length == records.length && b.nClasses == 5)
    assert(i.x.length == records.length && i.nClasses == 4)
    assert(b.x(0).length == Features.leafSlice.size)
    assert(i.x(0).length == 3)
    assert(b.y.forall(y => y >= 0 && y < 5))
    assert(i.y.forall(y => y >= 0 && y < 4))
  }

  test("models train and score on the task (MRR in (0, 1])") {
    val task = UTune.boundTask(records, Features.leafSlice)
    val scores = UTune.evaluateModels(task)
    assert(scores.length == 5)
    scores.foreach { s =>
      assert(s.mrr > 0.0 && s.mrr <= 1.0, s"${s.model} mrr ${s.mrr}")
      assert(s.trainMs >= 0.0)
    }
  }

  test("BDT baseline scores within (0, 1]") {
    val task = UTune.boundTask(records, Features.leafSlice)
    val score = UTune.evaluateBdt(task, UTune.bdtBound)
    assert(score > 0.0 && score <= 1.0)
  }

  test("predictStrategy returns a runnable strategy") {
    val s = UTune.predictStrategy(records, records.head.features)
    assert(s != null)
    val pts = Datasets.generate(Datasets.byName("Skin"), frac = 0.05)
    val init = repro.core.Init.kmeansPlusPlus(pts, 10, 1L)
    val res = repro.core.Runner.fitLocal(s, pts, 10, init, maxIters = 3)
    val ref = repro.core.Runner.fitLocal(Strategies.lloyd, pts, 10, init, maxIters = 3)
    assert(math.abs(res.sse - ref.sse) / math.max(ref.sse, 1e-12) < 1e-6)
  }
}
