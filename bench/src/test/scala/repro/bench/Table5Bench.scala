package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.tune.{Features, UTune}

/** Table 5 (MRR of BDT/DT/RF/SVM/kNN/RC × feature groups × full vs
  * selective ground truth), Table 7 (training/prediction times) and the
  * Figure-15 comparison of ground-truth generation efficiency.
  */
class Table5Bench extends AnyFunSuite {

  private val featureSets = Seq(
    ("Basic", Features.basicSlice),
    ("+Tree", Features.treeSlice),
    ("+Leaf", Features.leafSlice))

  test("Tables 5 and 7: knob-configuration prediction accuracy and cost") {
    val sel = BenchEnv.selective
    val ful = BenchEnv.full

    val sections = Seq(
      ("Bound@MRR", ful.records, UTune.boundTask _, UTune.bdtBound),
      ("Index@MRR", ful.records, UTune.indexTask _, UTune.bdtIndex),
      ("S-Bound@MRR", sel.records, UTune.boundTask _, UTune.bdtBound),
      ("S-Index@MRR", sel.records, UTune.indexTask _, UTune.bdtIndex))

    val mrrRows = sections.map { case (label, records, taskOf, bdt) =>
      val bdtScore = UTune.evaluateBdt(taskOf(records, Features.leafSlice), bdt)
      val cells = featureSets.flatMap { case (_, slice) =>
        UTune.evaluateModels(taskOf(records, slice)).map(s => f"${s.mrr}%.2f")
      }
      Seq(label, f"$bdtScore%.2f") ++ cells
    }
    val modelNames = UTune.evaluateModels(
      UTune.boundTask(sel.records, Features.basicSlice)).map(_.model)
    val header = Seq("Accuracy", "BDT") ++
      featureSets.flatMap { case (fs, _) => modelNames.map(m => s"$fs $m") }

    val timing = UTune.evaluateModels(UTune.boundTask(sel.records, Features.leafSlice))
    val timingMd = BenchEnv.markdownTable(
      Seq("Model", "Training (ms)", "Prediction (µs/query)"),
      timing.map(s => Seq(s.model, f"${s.trainMs}%.2f", f"${s.predictUs}%.2f")))

    val md = "## Table 5 — MRR of knob-configuration prediction\n\n" +
      BenchEnv.markdownTable(header, mrrRows) +
      s"\n## Figure 15 — ground-truth generation efficiency\n\n" +
      BenchEnv.markdownTable(Seq("Mode", "Records", "Wall (s)", "s/record"),
        Seq(
          Seq("Full running", ful.records.size.toString, BenchEnv.fmt(ful.wallSeconds),
            BenchEnv.fmt(ful.wallSeconds / ful.records.size)),
          Seq("Selective running", sel.records.size.toString, BenchEnv.fmt(sel.wallSeconds),
            BenchEnv.fmt(sel.wallSeconds / sel.records.size)))) +
      "\n## Table 7 — model training/prediction time (selective, leaf features)\n\n" +
      timingMd +
      "\nPaper: S-Bound@MRR up to 0.89 (DT, leaf), S-Index@MRR up to 0.92; BDT 0.41–0.43.\n"
    BenchEnv.emit("table5.md", md)

    // ---- shape assertions ----
    // Selective running yields more records per unit time than full running.
    assert(sel.records.size > ful.records.size)
    assert(sel.wallSeconds / sel.records.size < ful.wallSeconds / ful.records.size)

    // Learned models beat the rule-of-thumb BDT on the selective ground
    // truth (paper's claim; we assert it for the best model because our BDT
    // baseline is unusually strong on clean synthetic analogs — see
    // EXPERIMENTS.md deviation 5).
    val sBoundTask = UTune.boundTask(sel.records, Features.leafSlice)
    val scores = UTune.evaluateModels(sBoundTask)
    val bestScore = scores.map(_.mrr).max
    val bdtScore = UTune.evaluateBdt(sBoundTask, UTune.bdtBound)
    assert(bestScore > bdtScore,
      f"best model $bestScore%.2f must beat BDT $bdtScore%.2f")

    // MRR of the deployed DT on selective truth is usable (paper: ~0.9).
    assert(scores.find(_.model == "DT").get.mrr > 0.5)

    // All MRRs are valid probabilities-of-rank numbers.
    mrrRows.foreach(r => r.tail.foreach(v => assert(v.toDouble >= 0.0 && v.toDouble <= 1.0)))
  }
}
