package repro.bench

import repro.SparkSpec
import repro.eval.{BenchResults, BenchTables}

/** Table I — one NFS epoch: time is dominated by feature evaluation, not
  * generation (the observation that motivates the whole paper).
  */
class TableISuite extends SparkSpec {

  private lazy val b = BenchResults(spark)

  test("Table I: print NFS one-epoch time breakdown") {
    println()
    println("TABLE I: one NFS epoch — time breakdown (paper: eval ≈ 90% of total)")
    println(BenchTables.tableI(b))
  }

  test("Table I shape: evaluation dominates, generation is negligible") {
    b.tableIRuns.foreach { r =>
      assert(r.evalMs > 0, s"${r.dataset}: no evaluation time recorded")
      assert(r.evalMs / r.totalMs > 0.5,
        s"${r.dataset}: eval ${r.evalMs}ms of total ${r.totalMs}ms — evaluation must dominate")
      assert(r.genMs / r.totalMs < 0.2,
        s"${r.dataset}: generation ${r.genMs}ms of total ${r.totalMs}ms — generation must be negligible")
    }
  }

  test("Table I shape: every probe dataset generates new features") {
    b.tableIRuns.foreach(r => assert(r.generated > 0, r.dataset))
  }
}
