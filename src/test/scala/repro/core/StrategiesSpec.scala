package repro.core

import org.scalatest.funsuite.AnyFunSuite

class StrategiesSpec extends AnyFunSuite {

  test("registry exposes all 12 sequential methods of the paper") {
    assert(Strategies.sequential.map(_.name).toSet ==
      Set("Elka", "Hame", "Drak", "Yinyang", "Regroup", "Heap",
        "Annu", "Expo", "Drift", "Vector", "Pami20", "Search"))
  }

  test("the UTune pool is the paper's five leaderboard methods") {
    assert(Strategies.pool.map(_.name) ==
      Seq("Hame", "Drak", "Heap", "Yinyang", "Regroup"))
  }

  test("lookup by name round-trips") {
    (Strategies.sequential :+ Strategies.lloyd :+ Strategies.index :+ Strategies.unik)
      .foreach(s => assert(Strategies(s.name) eq s))
  }

  test("unknown names fail loudly") {
    val e = intercept[RuntimeException](Strategies("Nope"))
    assert(e.getMessage.contains("unknown strategy"))
  }

  test("representatives match the paper's choices (SEQU=Yinyang, INDE=Ball-tree)") {
    assert(Strategies.sequ.name == "Yinyang")
    assert(Strategies.index.name == "Index")
    assert(Strategies.unik.name == "UniK")
  }

  test("FitResult pruning arithmetic") {
    val m = new Metrics
    m.dist = 50
    val r = FitResult("x", 10, Array(), 5, converged = true, m, m,
      Array(1L), Array(1L), Array(0L), 2L, 0.0, n = 10)
    // full = n·k·iters = 10·10·5 = 500; pruned = 1 − 50/500
    assert(math.abs(r.prunedRatio - 0.9) < 1e-12)
  }
}
