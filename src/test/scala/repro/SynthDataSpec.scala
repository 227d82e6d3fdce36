package repro

import org.apache.spark.sql.functions._
import repro.core.{Init, LloydKernel, Runner}
import repro.spark.SparkKMeans

/** The provided SynthData generators, extended for this paper's schema
  * (point datasets): determinism, shape, and end-to-end use through the
  * distributed engine.
  */
class SynthDataSpec extends SparkSpec {

  test("clusterPoints produces (id, features) at the requested scale factor") {
    val df = SynthData.clusterPoints(spark, "Skin", sf = 0.05)
    assert(df.columns.toSeq == Seq("id", "features"))
    val n = df.count()
    assert(n >= 32 && n <= repro.data.Datasets.byName("Skin").n)
    val d = df.select(size(col("features"))).first().getInt(0)
    assert(d == 4)
  }

  test("clusterPoints is deterministic in (name, sf, seed)") {
    val a = SynthData.clusterPoints(spark, "Kegg", sf = 0.02).collect().map(_.toString)
    val b = SynthData.clusterPoints(spark, "Kegg", sf = 0.02).collect().map(_.toString)
    assert(a.toSeq == b.toSeq)
  }

  test("clusterPoints feeds the distributed engine end-to-end") {
    val df = SynthData.clusterPoints(spark, "NYC", sf = 0.02)
    val pts = SparkKMeans.featuresRdd(df)
    val local = pts.collect()
    val init = Init.kmeansPlusPlus(local, 8, 3L)
    val dist = SparkKMeans.fit(spark, pts, LloydKernel, 8, init, maxIters = 4)
    val ref = Runner.fitLocal(LloydKernel, local, 8, init, maxIters = 4)
    assert(math.abs(dist.sse - ref.sse) / math.max(ref.sse, 1e-12) < 1e-6)
  }

  test("skewedClusterPoints yields zipf-skewed cluster sizes") {
    val df = SynthData.skewedClusterPoints(spark, rows = 5000, d = 3, nClusters = 50)
    val counts = df.groupBy("cluster").count().orderBy(desc("count")).collect()
    assert(counts.length > 1)
    val top = counts.head.getLong(1).toDouble
    val total = counts.map(_.getLong(1)).sum.toDouble
    assert(top / total > 0.2, s"head cluster share ${top / total} not skewed")
    assert(df.select(size(col("features"))).first().getInt(0) == 3)
  }

  test("provided TPC-H-lite generators still work (lineitem sample)") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.columns.contains("l_orderkey") && li.count() > 0)
    val agg = li.agg(min("l_quantity"), max("l_quantity")).first()
    assert(agg.getDouble(0) >= 1.0 && agg.getDouble(1) <= 51.0)
  }
}
