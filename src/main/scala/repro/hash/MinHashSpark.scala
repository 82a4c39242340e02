package repro.hash

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** MinHash signatures computed as a per-partition Spark aggregation.
  *
  * For DataFrame-resident features the argmin-per-dimension reduction is a
  * classic two-phase aggregation: each partition computes its local
  * (score, value) minima for all d dimensions, then the partials are merged.
  * Bit-for-bit identical to [[MinHashes.signature]] — covered by tests.
  */
object MinHashSpark {

  /** Signature of `valueCol`, where `idCol` holds the stable 0-based row ids
    * the hash functions are keyed on.
    */
  def signature(
      df: DataFrame,
      valueCol: String,
      idCol: String,
      d: Int,
      variant: HashVariant,
      seed: Long = 7L,
  ): Array[Double] = {
    require(d > 0, "signature dimension must be positive")
    val stats = df.agg(min(col(valueCol)) as "lo", max(col(valueCol)) as "hi").head()
    val lo    = stats.getDouble(0)
    val hi    = stats.getDouble(1)
    val eps   = 1e-6
    val range = hi - lo

    val rows = df.select(col(idCol).cast("long"), col(valueCol).cast("double")).rdd
      .map(r => (r.getLong(0).toInt, r.getDouble(1)))

    // (bestScore, bestNormValue) per signature dimension.
    val zero = Array.fill(d)((Double.MaxValue, 0.0))
    val mins = rows.treeAggregate(zero)(
      seqOp = (acc, row) => {
        val (i, v) = row
        val w = if (range < 1e-12) eps else eps + (1.0 - eps) * (v - lo) / range
        var k = 0
        while (k < d) {
          val s = MinHashes.score(variant, w, seed, k, i)
          if (s < acc(k)._1 || (s == acc(k)._1 && w < acc(k)._2)) acc(k) = (s, w)
          k += 1
        }
        acc
      },
      combOp = (a, b) => {
        var k = 0
        while (k < d) {
          if (b(k)._1 < a(k)._1 || (b(k)._1 == a(k)._1 && b(k)._2 < a(k)._2)) a(k) = b(k)
          k += 1
        }
        a
      },
    )
    mins.map(_._2).sorted
  }

  /** Convenience: signatures for every feature column f0..f{p−1} of a
    * [[repro.data.TabularData.toDF]]-shaped DataFrame.
    */
  def signatures(
      spark: SparkSession,
      df: DataFrame,
      d: Int,
      variant: HashVariant,
      seed: Long = 7L,
  ): Map[String, Array[Double]] = {
    val withId = df.withColumn("__rid", monotonically_increasing_id())
    // monotonically_increasing_id is partition-offset based; re-rank to dense
    // 0-based ids so the hash keys match the local row indices.
    val ranked = withId
      .withColumn("__rank",
        row_number().over(org.apache.spark.sql.expressions.Window.orderBy(col("__rid"))) - 1)
      .cache()
    try {
      df.columns.filter(_.startsWith("f")).map { c =>
        c -> signature(ranked, c, "__rank", d, variant, seed)
      }.toMap
    } finally { ranked.unpersist(); () }
  }
}
