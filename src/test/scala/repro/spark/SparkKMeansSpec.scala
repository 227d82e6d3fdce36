package repro.spark

import repro.core._
import repro.data.Datasets
import repro.{Oracle, SparkSpec}
import repro.unik.UniKStrategy

/** The distributed path must agree with the single-partition path, and the
  * Catalyst refinement must agree with DuckDB.
  */
class SparkKMeansSpec extends SparkSpec {

  private lazy val pts = TestData.mixture(800, 4, 10, 0.04, 81L)
  private val k = 12
  private lazy val init = Init.kmeansPlusPlus(pts, k, 82L)

  private def sparkFit(s: Strategy, parts: Int): FitResult = {
    val rdd = spark.sparkContext.parallelize(pts.toSeq, parts)
    SparkKMeans.fit(spark, rdd, s, k, init, maxIters = 8, numPartitions = parts)
  }

  for (s <- Seq[Strategy](LloydKernel, YinyangKernel, HameKernel, Pami20Kernel,
    Strategies.index, UniKStrategy.default)) {
    test(s"Spark ${s.name} over 4 partitions equals the local runner") {
      val local = Runner.fitLocal(s, pts, k, init, maxIters = 8)
      val dist = sparkFit(s, 4)
      val rel = math.abs(dist.sse - local.sse) / math.max(local.sse, 1e-12)
      assert(rel < 1e-6, s"sse ${dist.sse} vs ${local.sse}")
      assert(dist.iterations == local.iterations)
      // distance-computation counts may differ slightly for index methods
      // (per-partition trees) but sequential bounds are per-point: identical
      if (s.isInstanceOf[LloydKernel.type]) assert(dist.metrics.dist == local.metrics.dist)
    }
  }

  test("Spark Lloyd with a single partition reproduces local counters exactly") {
    val local = Runner.fitLocal(YinyangKernel, pts, k, init, maxIters = 8)
    val dist = sparkFit(YinyangKernel, 1)
    assert(dist.metrics.dist == local.metrics.dist)
    assert(dist.metrics.boundAccess == local.metrics.boundAccess)
  }

  test("DataFrameKMeans assignment+refinement matches the kernel centroids") {
    val df = Datasets.toDF(spark, pts)
    val got = DataFrameKMeans.fit(spark, df, k, init, maxIters = 3)
    val local = Runner.fitLocal(LloydKernel, pts, k, init, maxIters = 3)
    got.zip(local.centroids).foreach { case (a, b) =>
      a.indices.foreach(i => assert(math.abs(a(i) - b(i)) < 1e-9))
    }
  }

  test("relational refinement agrees with DuckDB (Oracle)") {
    import org.apache.spark.sql.functions._
    val small = pts.take(200)
    val assignedPts = {
      val st = LloydKernel.newState(small, 5, 0L)
      val init5 = Init.kmeansPlusPlus(small, 5, 83L)
      Runner.fitStates(LloydKernel, Seq(st), ps => ps.head.step(_: CentroidInfo), 5, init5, 1, 0L)
      st.assignments
    }
    val wide = Datasets.toWideDF(spark, small)
    import spark.implicits._
    val assignDf = assignedPts.zipWithIndex.map { case (c, i) => (i.toLong, c) }.toSeq
      .toDF("id", "cluster")
    val joined = wide.join(assignDf, "id")
    val d = small(0).length
    val sparkAgg = joined.groupBy($"cluster")
      .agg(count(lit(1)).as("cnt"),
        (0 until d).map(i => avg(col(s"f$i")).as(s"m$i")): _*)
    val duckSql =
      s"SELECT cluster, count(*) AS cnt, " +
        (0 until d).map(i => s"avg(CAST(f$i AS DOUBLE)) AS m$i").mkString(", ") +
        " FROM pts GROUP BY cluster"
    Oracle.assertEquivalent(sparkAgg, duckSql, "pts" -> joined)
  }
}
