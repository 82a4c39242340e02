package repro.hash

import repro.SparkSpec
import repro.data.{SyntheticTabular, TabularData}
import scala.util.Random

class MinHashSparkSpec extends SparkSpec {

  private def dfWithIds(values: Array[Double]) = {
    import org.apache.spark.sql.Row
    import org.apache.spark.sql.types._
    val schema = StructType(Seq(
      StructField("id", LongType, nullable = false),
      StructField("v", DoubleType, nullable = false),
    ))
    val rows = values.zipWithIndex.map { case (v, i) => Row(i.toLong, v) }
    spark.createDataFrame(spark.sparkContext.parallelize(rows.toSeq, 4), schema)
  }

  test("Spark aggregation matches the local signature bit-for-bit (all variants)") {
    val rng    = new Random(2)
    val values = Array.fill(500)(rng.nextGaussian() * 3 + 1)
    val df     = dfWithIds(values)
    for (variant <- HashVariant.all) {
      val local = MinHashes.signature(values, 24, variant, seed = 9)
      val dist  = MinHashSpark.signature(df, "v", "id", 24, variant, seed = 9)
      assert(local.sameElements(dist), s"variant ${variant.name}")
    }
  }

  test("Spark aggregation is partition-count independent") {
    val rng    = new Random(3)
    val values = Array.fill(300)(rng.nextDouble() * 10)
    val df1    = dfWithIds(values).repartition(1)
    val df8    = dfWithIds(values).repartition(8)
    val a = MinHashSpark.signature(df1, "v", "id", 16, HashVariant.CCWS)
    val b = MinHashSpark.signature(df8, "v", "id", 16, HashVariant.CCWS)
    assert(a.sameElements(b))
  }

  test("signatures() computes per-feature signatures of a tabular DataFrame") {
    val data = SyntheticTabular.generate(
      SyntheticTabular.Spec("mh-spark", 120, 4, classification = true, seed = 5))
    val df   = data.toDF(spark)
    val sigs = MinHashSpark.signatures(spark, df, 8, HashVariant.Plain, seed = 3)
    assert(sigs.keySet === Set("f0", "f1", "f2", "f3"))
    sigs.values.foreach(s => assert(s.length === 8))
    // Cross-check one column against the local path.
    val local = MinHashes.signature(data.column(2), 8, HashVariant.Plain, seed = 3)
    assert(sigs("f2").sameElements(local))
  }
}
