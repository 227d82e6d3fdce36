package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Lloyd's algorithm expressed on the DataFrame/Catalyst API: assignment is
  * a UDF argmin over broadcast centroids, refinement is a relational
  * `GROUP BY cluster` aggregation of per-dimension sums — the piece of the
  * pipeline that `repro.Oracle` cross-checks against DuckDB row-for-row.
  */
object DataFrameKMeans {

  /** Assign each row's `features` array to the nearest centroid. */
  def assignDf(df: DataFrame, centroids: Array[Array[Double]]): DataFrame = {
    val cs = centroids
    val nearest = udf { (xs: Seq[Double]) =>
      var best = 0; var bd = Double.PositiveInfinity
      var j = 0
      while (j < cs.length) {
        var s = 0.0
        var i = 0
        while (i < xs.length) { val t = xs(i) - cs(j)(i); s += t * t; i += 1 }
        if (s < bd) { bd = s; best = j }
        j += 1
      }
      best
    }
    df.withColumn("cluster", nearest(col("features")))
  }

  /** Refinement as a relational aggregation: one sum + count per cluster. */
  def refineDf(assigned: DataFrame, d: Int): DataFrame = {
    val aggs =
      (0 until d).map(i => sum(element_at(col("features"), i + 1)).as(s"s$i")) :+
        count(lit(1)).as("cnt")
    assigned.groupBy(col("cluster")).agg(aggs.head, aggs.tail: _*)
  }

  /** Full Lloyd loop on DataFrames. Returns the final centroids. */
  def fit(spark: SparkSession, df: DataFrame, k: Int, init: Array[Array[Double]],
          maxIters: Int = 10): Array[Array[Double]] = {
    val d = init.headOption.map(_.length).getOrElse(0)
    var centroids = init.map(_.clone)
    val cached = df.cache()
    cached.count()
    var t = 0
    while (t < maxIters) {
      val rows = refineDf(assignDf(cached, centroids), d).collect()
      val next = centroids.map(_.clone)
      rows.foreach { r =>
        val j = r.getInt(0)
        val cnt = r.getLong(d + 1)
        if (cnt > 0) {
          var i = 0
          while (i < d) { next(j)(i) = r.getDouble(i + 1) / cnt; i += 1 }
        }
      }
      centroids = next
      t += 1
    }
    cached.unpersist()
    centroids
  }
}
