package repro.bench

import repro.SparkSpec
import repro.eval.{BenchResults, BenchTables}

/** Table V — the selected features are robust to swapping the downstream
  * model (SVM / NB·GP / MLP): E-AFE's features keep winning.
  */
class TableVSuite extends SparkSpec {

  private lazy val b = BenchResults(spark)

  private def mean(method: String, swap: String): Double =
    b.datasets.map(ds => b.tableVScores((ds, method, swap))).sum / b.datasets.size

  test("Table V: print downstream-task swap results") {
    println()
    println("TABLE V: selected features re-evaluated under SVM / NB-GP / MLP")
    println(BenchTables.tableV(b))
    println()
    for (swap <- Seq("svm", "nbgp", "mlp"))
      println(f"$swap means: FS_R=${mean("fsr", swap)}%.3f NFS=${mean("nfs", swap)}%.3f " +
        f"E-AFE=${mean("eafe:ccws", swap)}%.3f")
  }

  test("Table V shape: E-AFE's features beat AutoFS_R's under every swap model") {
    for (swap <- Seq("svm", "nbgp", "mlp")) {
      assert(mean("eafe:ccws", swap) >= mean("fsr", swap) - 0.01,
        f"$swap: E-AFE=${mean("eafe:ccws", swap)}%.3f FS_R=${mean("fsr", swap)}%.3f")
    }
  }

  test("Table V shape: E-AFE's features at least match NFS's under every swap model") {
    for (swap <- Seq("svm", "nbgp", "mlp")) {
      assert(mean("eafe:ccws", swap) >= mean("nfs", swap) - 0.02,
        f"$swap: E-AFE=${mean("eafe:ccws", swap)}%.3f NFS=${mean("nfs", swap)}%.3f")
    }
  }

  test("Table V sanity: all swap scores are valid metric values") {
    b.tableVScores.foreach { case (k, s) =>
      assert(s >= 0.0 && s <= 1.0, s"$k → $s")
    }
  }
}
