package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.Datasets
import repro.index.BallTree

/** Table 2: dataset overview + Ball-tree construction time + #nodes.
  * Paper numbers are listed alongside for EXPERIMENTS.md; ours use the
  * scaled synthetic analogs so absolute values differ, but construction
  * stays cheap relative to clustering (the paper's point) and #nodes tracks
  * n/capacity.
  */
class Table2Bench extends AnyFunSuite {

  // (name → (paper build seconds, paper #nodes)) from Table 2
  private val paper = Map(
    "BigCross" -> (10.8, "183k"), "Conflong" -> (0.26, "21.8k"),
    "Covtype" -> (3.87, "88.3k"), "Europe" -> (0.27, "11.2k"),
    "KeggD" -> (0.17, "2.8k"), "Kegg" -> (0.31, "4.5k"),
    "NYC" -> (8.7, "228k"), "Skin" -> (0.33, "21.2k"),
    "Power" -> (4.3, "43.7k"), "Road" -> (0.55, "6.9k"),
    "Census" -> (204.0, "135k"), "Mnist" -> (4.8, "7.3k"))

  test("Table 2: index construction time and node count per dataset") {
    BenchEnv.warm()
    val rows = Datasets.all.filterNot(_.holdout).map { spec =>
      val pts = BenchEnv.points(spec.name)
      val tree = BallTree.build(pts)
      Seq(spec.name, s"${pts.length} (paper ${spec.paperN})",
        s"${spec.d}${if (spec.d != spec.paperD) s" (paper ${spec.paperD})" else ""}",
        BenchEnv.fmt(tree.buildNanos / 1e9),
        tree.nodeCount.toString,
        paper.get(spec.name).map(p => s"${p._1}s / ${p._2}").getOrElse("—"))
    }
    val md = "## Table 2 — datasets, Ball-tree build time (s), #nodes\n\n" +
      BenchEnv.markdownTable(
        Seq("Dataset", "n", "d", "Build (s)", "#Nodes", "Paper build/#nodes"), rows)
    BenchEnv.emit("table2.md", md)

    // sanity: construction must stay sub-second at this scale, and node
    // counts must be within a factor ~2 of 2·n/f (balanced binary tree)
    Datasets.all.filterNot(_.holdout).foreach { spec =>
      val pts = BenchEnv.points(spec.name)
      val tree = BallTree.build(pts)
      assert(tree.buildNanos / 1e9 < 30.0)
      assert(tree.nodeCount <= 4 * pts.length / 30 + 64)
    }
  }
}
