package repro.core

import org.apache.spark.sql.functions.col
import repro.SparkSpec
import repro.data.SyntheticTabular
import scala.collection.mutable

class FeatExprSpec extends SparkSpec {

  private val cols = Array(
    Array(1.0, 2.0, 3.0),
    Array(4.0, 5.0, 6.0),
  )

  test("Raw evaluates to the underlying column") {
    val memo = mutable.Map.empty[String, Array[Double]]
    assert(Raw(1).evalLocal(cols, memo).toSeq === Seq(4.0, 5.0, 6.0))
  }

  test("Derived applies the operator elementwise") {
    val memo = mutable.Map.empty[String, Array[Double]]
    val e    = FeatExpr.derive(Ops.Add, Raw(0), Raw(1))
    assert(e.evalLocal(cols, memo).toSeq === Seq(5.0, 7.0, 9.0))
  }

  test("order counts nested transformations, Raw is order 0") {
    val e1 = FeatExpr.derive(Ops.Log, Raw(0), Raw(0))
    val e2 = FeatExpr.derive(Ops.Mul, e1, Raw(1))
    val e3 = FeatExpr.derive(Ops.Sqrt, e2, e2)
    assert(Raw(0).order === 0)
    assert(e1.order === 1 && e2.order === 2 && e3.order === 3)
  }

  test("commutative ops canonicalize operand order for dedup") {
    val a = FeatExpr.derive(Ops.Add, Raw(0), Raw(1))
    val b = FeatExpr.derive(Ops.Add, Raw(1), Raw(0))
    assert(a.key === b.key)
    val m1 = FeatExpr.derive(Ops.Mul, Raw(1), Raw(0))
    val m2 = FeatExpr.derive(Ops.Mul, Raw(0), Raw(1))
    assert(m1.key === m2.key)
  }

  test("non-commutative ops keep operand order") {
    val a = FeatExpr.derive(Ops.Sub, Raw(0), Raw(1))
    val b = FeatExpr.derive(Ops.Sub, Raw(1), Raw(0))
    assert(a.key !== b.key)
  }

  test("unary derive ignores the second operand") {
    val e = FeatExpr.derive(Ops.Sqrt, Raw(0), Raw(1))
    assert(e.key === "sqrt(f0)")
    assert(e.rawIdx === Set(0))
  }

  test("rawIdx collects all referenced raw features") {
    val e = FeatExpr.derive(Ops.Div, FeatExpr.derive(Ops.Add, Raw(0), Raw(1)), Raw(2))
    assert(e.rawIdx === Set(0, 1, 2))
  }

  test("memoization reuses computed sub-expressions") {
    val memo = mutable.Map.empty[String, Array[Double]]
    val sub  = FeatExpr.derive(Ops.Mul, Raw(0), Raw(1))
    val e    = FeatExpr.derive(Ops.Add, sub, sub)
    e.evalLocal(cols, memo)
    assert(memo.contains(sub.key) && memo.contains(e.key))
  }

  test("parse round-trips nested keys") {
    val exprs = Seq(
      Raw(3),
      FeatExpr.derive(Ops.Log, Raw(12), Raw(12)),
      FeatExpr.derive(Ops.Div, FeatExpr.derive(Ops.Add, Raw(0), Raw(1)),
        FeatExpr.derive(Ops.Sqrt, Raw(2), Raw(2))),
      FeatExpr.derive(Ops.Mod, Raw(5), FeatExpr.derive(Ops.Mul, Raw(1), Raw(4))),
    )
    exprs.foreach { e =>
      val parsed = FeatExpr.parse(e.key)
      assert(parsed.key === e.key)
      assert(parsed.order === e.order)
    }
  }

  test("parse rejects malformed keys") {
    intercept[Exception](FeatExpr.parse("add(f0,f1"))
    intercept[Exception](FeatExpr.parse("nosuch(f0)"))
    intercept[Exception](FeatExpr.parse("f0extra,"))
  }

  test("toColumn matches evalLocal on a real DataFrame") {
    val data = SyntheticTabular.generate(
      SyntheticTabular.Spec("fx", 60, 3, classification = true, seed = 8))
    val df   = data.toDF(spark)
    val e = FeatExpr.derive(Ops.Div,
      FeatExpr.derive(Ops.Add, Raw(0), Raw(1)),
      FeatExpr.derive(Ops.Sqrt, Raw(2), Raw(2)))
    val memo  = mutable.Map.empty[String, Array[Double]]
    val local = e.evalLocal(data.columns, memo).sorted
    val viaDf = df.select(e.toColumn.as("out")).collect().map(_.getDouble(0)).sorted
    local.zip(viaDf).foreach { case (l, g) => assert(math.abs(l - g) < 1e-9) }
  }

  test("toColumn of MinMax uses the global window") {
    val data = SyntheticTabular.generate(
      SyntheticTabular.Spec("fx2", 40, 2, classification = true, seed = 9))
    val df   = data.toDF(spark)
    val e    = FeatExpr.derive(Ops.MinMax, Raw(0), Raw(0))
    val out  = df.select(e.toColumn.as("out")).collect().map(_.getDouble(0))
    assert(math.abs(out.min - 0.0) < 1e-12 && math.abs(out.max - 1.0) < 1e-12)
  }
}
