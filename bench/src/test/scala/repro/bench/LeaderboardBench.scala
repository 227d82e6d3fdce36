package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Strategies

/** Figure 12 (leaderboard of sequential methods as top-1 and top-3) —
  * reproduced because it selects UTune's five-method pool, and Table 4's
  * "Leaderboard" column derives from it.
  */
class LeaderboardBench extends AnyFunSuite {

  test("Leaderboard: top-1 / top-3 finishes of sequential methods") {
    val records = BenchEnv.full.records
    val seqNames = Strategies.sequential.map(_.name)

    val top1 = scala.collection.mutable.Map[String, Int]().withDefaultValue(0)
    val top3 = scala.collection.mutable.Map[String, Int]().withDefaultValue(0)
    records.foreach { r =>
      val ranked = seqNames.filter(r.seqTimes.contains).sortBy(r.seqTimes)
      top1(ranked.head) += 1
      ranked.take(3).foreach(m => top3(m) += 1)
    }

    val rows = seqNames.sortBy(-top3(_)).map { m =>
      Seq(m, top1(m).toString, top3(m).toString,
        if (Strategies.pool.exists(_.name == m)) "pool" else "")
    }
    val md = "## Figure 12 — leaderboard of sequential methods " +
      s"(${records.size} tasks, full running)\n\n" +
      BenchEnv.markdownTable(Seq("Method", "Top-1", "Top-3", "UTune pool"), rows) +
      "\nPaper: Hame, Drak, Heap, Yinyang, Regroup dominate the leaderboard.\n"
    BenchEnv.emit("leaderboard.md", md)

    // the five-method pool must collectively account for a meaningful share
    val poolTop3 = Strategies.pool.map(s => top3(s.name)).sum
    val allTop3 = records.size * 3
    assert(poolTop3 > 0, "pool methods never reach the top-3?")
    BenchEnv.emit("leaderboard_share.md",
      f"Pool share of top-3 finishes: ${poolTop3.toDouble / allTop3}%.2f\n")
  }
}
