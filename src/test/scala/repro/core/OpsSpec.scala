package repro.core

import org.apache.spark.sql.Row
import org.apache.spark.sql.functions.col
import org.apache.spark.sql.types._
import repro.{Oracle, SparkSpec}
import scala.util.Random

/** Each operator: local impl == Catalyst impl == DuckDB SQL (oracle). */
class OpsSpec extends SparkSpec {

  private val rng = new Random(7)

  private def mkDf(a: Array[Double], b: Array[Double]) = {
    val schema = StructType(Seq(
      StructField("id", LongType, nullable = false),
      StructField("a", DoubleType, nullable = false),
      StructField("b", DoubleType, nullable = false),
    ))
    val rows = a.indices.map(i => Row(i.toLong, a(i), b(i)))
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 3), schema)
  }

  // Includes awkward values: zeros, negatives, near-zero divisors.
  private def sample(n: Int): Array[Double] =
    Array.tabulate(n)(i => i match {
      case 0 => 0.0
      case 1 => -1.5
      case 2 => 1e-12
      case _ => rng.nextGaussian() * 5
    })

  private def localVsCatalyst(op: Op): Unit = {
    val a  = sample(40)
    val b  = sample(40)
    val df = mkDf(a, b)
    val local = op.applyLocal(a, b)
    val cb    = if (op.isUnary) col("a") else col("b")
    val got = df
      .withColumn("out", op.column(col("a"), cb))
      .orderBy("id")
      .select("out")
      .collect()
      .map(_.getDouble(0))
    local.zip(got).zipWithIndex.foreach { case ((l, g), i) =>
      assert(math.abs(l - g) < 1e-9, s"${op.name} row $i: local=$l catalyst=$g (a=${a(i)}, b=${b(i)})")
    }
  }

  private def oracleCheck(op: Op): Unit = {
    val a  = sample(25)
    val b  = sample(25)
    val df = mkDf(a, b)
    val cb = if (op.isUnary) col("a") else col("b")
    val sparkOut = df.select(col("id"), op.column(col("a"), cb).as("out"))
    val sql =
      s"SELECT CAST(id AS BIGINT) AS id, ${op.duckSql("CAST(a AS DOUBLE)", "CAST(b AS DOUBLE)")} AS out FROM t"
    Oracle.assertEquivalent(sparkOut, sql, "t" -> df)
  }

  for (op <- Ops.all) {
    test(s"${op.name}: local implementation matches Catalyst column") {
      localVsCatalyst(op)
    }
    test(s"${op.name}: Catalyst column matches DuckDB oracle") {
      oracleCheck(op)
    }
  }

  test("log is total on negatives and zero") {
    val out = Ops.Log.applyLocal(Array(-10.0, 0.0, 10.0), Array.empty)
    assert(out(1) === 0.0)
    assert(out(0) === out(2)) // |x| symmetry
  }

  test("sqrt is total on negatives") {
    val out = Ops.Sqrt.applyLocal(Array(-4.0), Array.empty)
    assert(out(0) === 2.0)
  }

  test("minmax maps to [0,1] with min→0 and max→1") {
    val out = Ops.MinMax.applyLocal(Array(2.0, 4.0, 6.0), Array.empty)
    assert(out.toSeq === Seq(0.0, 0.5, 1.0))
  }

  test("minmax of a constant column is all-zero (guard)") {
    val out = Ops.MinMax.applyLocal(Array(3.0, 3.0, 3.0), Array.empty)
    assert(out.forall(_ === 0.0))
  }

  test("reciprocal guards zero") {
    val out = Ops.Recip.applyLocal(Array(0.0, 2.0, -0.5), Array.empty)
    assert(out.toSeq === Seq(0.0, 0.5, -2.0))
  }

  test("div and mod guard zero divisors") {
    val a = Array(10.0, 10.0)
    val b = Array(0.0, 4.0)
    assert(Ops.Div.applyLocal(a, b).toSeq === Seq(0.0, 2.5))
    assert(Ops.Mod.applyLocal(a, b).toSeq === Seq(0.0, 2.0))
  }

  test("mod is floored modulo (result has the divisor's sign)") {
    assert(Ops.Mod.applyLocal(Array(-7.0), Array(3.0))(0) === 2.0)
    assert(Ops.Mod.applyLocal(Array(7.0), Array(-3.0))(0) === -2.0)
  }

  test("action space is the paper's 4 unary + 5 binary operators") {
    assert(Ops.unary.map(_.name) === IndexedSeq("log", "mmn", "sqrt", "recip"))
    assert(Ops.binary.map(_.name) === IndexedSeq("add", "sub", "mul", "div", "mod"))
    assert(Ops.all.size === 9)
    assert(Ops.unary.forall(_.isUnary) && Ops.binary.forall(!_.isUnary))
  }

  test("byName resolves every operator and rejects unknowns") {
    Ops.all.foreach(op => assert(Ops.byName(op.name) eq op))
    intercept[RuntimeException](Ops.byName("exp"))
  }

  test("applyDf appends the transformed column") {
    val df  = mkDf(sample(10), sample(10))
    val out = Ops.applyDf(df, "z", Ops.Add, "a", "b").orderBy("id").collect()
    out.foreach(r => assert(r.getAs[Double]("z") === r.getAs[Double]("a") + r.getAs[Double]("b")))
  }
}
