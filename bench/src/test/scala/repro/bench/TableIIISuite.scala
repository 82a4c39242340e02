package repro.bench

import repro.SparkSpec
import repro.eval.{BenchResults, BenchTables}

/** Table III — the 11-method comparison on the 36 target datasets. */
class TableIIISuite extends SparkSpec {

  private lazy val b = BenchResults(spark)

  private def mean(method: String): Double =
    b.datasets.map(ds => b.grid((ds, method)).score).sum / b.datasets.size

  test("Table III: print method comparison on 36 datasets") {
    println()
    println("TABLE III: comparison results on 36 target datasets (F1 / 1-rae)")
    println(BenchTables.tableIII(b))
    println()
    println("column means: " + b.methods.map(m => f"$m=${mean(m)}%.3f").mkString("  "))
  }

  test("Table III shape: E-AFE matches or beats NFS on average") {
    val eafe = mean("eafe:ccws")
    val nfs  = mean("nfs")
    assert(eafe >= nfs - 0.01, f"E-AFE=$eafe%.3f NFS=$nfs%.3f")
  }

  test("Table III shape: NFS beats random generation (AutoFS_R) on average") {
    assert(mean("nfs") >= mean("fsr") - 0.015,
      f"NFS=${mean("nfs")}%.3f FS_R=${mean("fsr")}%.3f")
  }

  test("Table III shape: the DNN baseline is the weakest column") {
    val dln = mean("dln")
    Seq("fsr", "nfs", "eafe:ccws").foreach { m =>
      assert(dln < mean(m), f"DL_N=$dln%.3f vs $m=${mean(m)}%.3f")
    }
  }

  test("Table III shape: DNN collapses (≤0.3) on at least one tiny dataset") {
    val tiny = Seq("labor", "fertility", "hepatitis", "lymph")
    val collapsed = tiny.map(ds => b.grid((ds, "dln")).score)
    assert(collapsed.exists(_ <= 0.6), s"dln on tiny datasets: $collapsed")
  }

  test("Table III shape: hash variants agree within noise (Q6)") {
    val variants = Seq("eafe:ccws", "eafe:icws", "eafe:pcws", "eafe:licws").map(mean)
    assert(variants.max - variants.min < 0.05,
      s"variant means spread too far: $variants")
  }

  test("Table III shape: full E-AFE is at least as good as its ablations") {
    val eafe = mean("eafe:ccws")
    assert(eafe >= mean("eafe_d") - 0.015, f"vs E-AFE_D=${mean("eafe_d")}%.3f")
    assert(eafe >= mean("eafe_r") - 0.015, f"vs E-AFE_R=${mean("eafe_r")}%.3f")
  }

  test("Table III sanity: every score is a valid metric value") {
    b.grid.values.foreach { r =>
      assert(r.score >= 0.0 && r.score <= 1.0, s"${r.dataset}/${r.method}: ${r.score}")
    }
  }

  test("Table III sanity: RL methods never fall below their raw baseline") {
    for (ds <- b.datasets; m <- Seq("fsr", "nfs", "eafe_r", "eafe_d", "eafe:ccws")) {
      val r = b.grid((ds, m))
      assert(r.score >= r.baseScore, s"$ds/$m: ${r.score} < base ${r.baseScore}")
    }
  }
}
