package repro.data

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._

/** A small tabular dataset held locally (row-major) with a DataFrame bridge.
  *
  * The RL loop and the downstream learners operate on the local form (a
  * single candidate evaluation is milliseconds); DataFrames carry the
  * Catalyst-expressed feature transformations and the oracle checks.
  */
final case class TabularData(
    name: String,
    x: Array[Array[Double]],
    y: Array[Double],
    classification: Boolean,
) extends Serializable {

  require(x.nonEmpty && x.length == y.length, s"$name: empty or mismatched data")

  def nSamples: Int  = x.length
  def nFeatures: Int = x(0).length

  /** Column j as an array (copied). */
  def column(j: Int): Array[Double] = {
    val out = new Array[Double](nSamples)
    var i   = 0
    while (i < nSamples) { out(i) = x(i)(j); i += 1 }
    out
  }

  def columns: Array[Array[Double]] = Array.tabulate(nFeatures)(column)

  /** New dataset keeping only the given feature indices (order preserved). */
  def select(featureIdx: Seq[Int]): TabularData =
    copy(x = x.map(row => featureIdx.map(row).toArray))

  /** New dataset with extra columns appended (each of length nSamples). */
  def withColumns(extra: Seq[Array[Double]]): TabularData = {
    extra.foreach(c => require(c.length == nSamples, "appended column length mismatch"))
    copy(x = Array.tabulate(nSamples)(i => x(i) ++ extra.map(_(i))))
  }

  /** Deterministic row subsample (no replacement) to at most `n` rows. */
  def subsample(n: Int, seed: Long): TabularData =
    if (nSamples <= n) this
    else {
      val rng  = new scala.util.Random(seed)
      val keep = rng.shuffle(x.indices.toList).take(n).sorted
      copy(x = keep.map(x).toArray, y = keep.map(y).toArray)
    }

  /** DataFrame with columns f0..f{p−1}, label — stable ordering. */
  def toDF(spark: SparkSession): DataFrame = {
    val schema = StructType(
      (0 until nFeatures).map(j => StructField(s"f$j", DoubleType, nullable = false)) :+
        StructField("label", DoubleType, nullable = false)
    )
    val rows = x.indices.map(i => Row.fromSeq(x(i).toSeq :+ y(i)))
    spark.createDataFrame(spark.sparkContext.parallelize(rows.toSeq, 4), schema)
  }
}

object TabularData {

  /** Rebuild from a DataFrame produced by [[TabularData.toDF]] (or any DF of
    * double feature columns plus a `label` column). Row order is made
    * deterministic by sorting on all columns.
    */
  def fromDF(df: DataFrame, name: String, classification: Boolean): TabularData = {
    val featCols = df.columns.filter(_ != "label").sorted
    val collected = df
      .select((featCols :+ "label").map(org.apache.spark.sql.functions.col): _*)
      .collect()
      .sortBy(_.toSeq.map(String.valueOf).mkString("|"))
    TabularData(
      name,
      collected.map(r => featCols.indices.map(i => r.getDouble(i)).toArray),
      collected.map(_.getDouble(featCols.length)),
      classification,
    )
  }
}
