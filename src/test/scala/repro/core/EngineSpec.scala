package repro.core

import repro.SparkSpec
import repro.data.{DatasetRegistry, SyntheticTabular}
import repro.fpe.{FpeLabeler, FpeModel}
import repro.hash.HashVariant

class EngineSpec extends SparkSpec {

  private lazy val data = SyntheticTabular.generate(
    SyntheticTabular.Spec("engine-ds", 200, 5, classification = true, seed = 21))

  private lazy val fpe: FpeModel.Trained = {
    val labeled = FpeLabeler.labelAll(DatasetRegistry.publicPretrain(6),
      FpeLabeler.Config(folds = 3, rfTrees = 5, rfDepth = 5))
    FpeModel.trainBest(labeled, variants = Seq(HashVariant.CCWS), dims = Seq(16), seed = 1)
  }

  private def tinyCfg(method: String) = MethodConfig(
    method, stage1Epochs = 1, stage2Epochs = 2, T = 2,
    rfTrees = 4, rfDepth = 4, evalSampleCap = 150, seed = 5)

  test("NFS run returns a score at least as good as the raw baseline") {
    val r = new Engine(data, tinyCfg("nfs"), None, None).run()
    assert(r.score >= r.baseScore)
    assert(r.method === "nfs")
  }

  test("runs are deterministic in the seed") {
    val a = new Engine(data, tinyCfg("nfs"), None, None).run()
    val b = new Engine(data, tinyCfg("nfs"), None, None).run()
    assert(a.score === b.score)
    assert(a.generated === b.generated && a.evaluated === b.evaluated)
    assert(a.selectedKeys === b.selectedKeys)
  }

  test("Spark-parallel candidate evaluation matches the sequential path") {
    val seq = new Engine(data, tinyCfg("nfs"), None, None).run()
    val par = new Engine(data, tinyCfg("nfs"), None, Some(spark)).run()
    assert(seq.score === par.score)
    assert(seq.evaluated === par.evaluated)
    assert(seq.selectedKeys === par.selectedKeys)
  }

  test("learning curve is monotone non-decreasing (best-so-far)") {
    val r = new Engine(data, tinyCfg("nfs"), None, None).run()
    r.curve.sliding(2).foreach {
      case Seq(a, b) => assert(b >= a)
      case _         =>
    }
    assert(r.curve.length === tinyCfg("nfs").totalEpochs)
  }

  test("selected keys parse back into valid programs and include candidates within order cap") {
    val r = new Engine(data, tinyCfg("nfs"), None, None).run()
    r.selectedKeys.foreach { k =>
      val e = FeatExpr.parse(k)
      assert(e.order <= tinyCfg("nfs").maxOrder)
    }
    // all raw features remain in the state
    (0 until data.nFeatures).foreach(i => assert(r.selectedKeys.contains(s"f$i")))
  }

  test("E-AFE evaluates fewer features downstream than NFS") {
    val nfs  = new Engine(data, tinyCfg("nfs"), None, None).run()
    val eafe = new Engine(data, tinyCfg("eafe"), Some(fpe), None).run()
    assert(eafe.evaluated < nfs.evaluated,
      s"eafe=${eafe.evaluated} nfs=${nfs.evaluated}")
  }

  test("E-AFE without an FPE model is rejected") {
    intercept[IllegalArgumentException] {
      new Engine(data, tinyCfg("eafe"), None, None)
    }
  }

  test("E-AFE_D drops roughly half of the candidates") {
    val nfs = new Engine(data, tinyCfg("nfs"), None, None).run()
    val d   = new Engine(data, tinyCfg("eafe_d"), None, None).run()
    assert(d.evaluated < nfs.evaluated)
  }

  test("E-AFE_R (flat policy gradient + FPE) runs and reports the hash variant") {
    val r = new Engine(data, tinyCfg("eafe_r"), Some(fpe), None).run()
    assert(r.score >= r.baseScore * 0.9)
    assert(r.hashVariant === "ccws")
  }

  test("AutoFS_R (random generation) evaluates at least as many features as NFS") {
    val nfs = new Engine(data, tinyCfg("nfs"), None, None).run()
    val fsr = new Engine(data, tinyCfg("fsr"), None, None).run()
    assert(fsr.evaluated >= nfs.evaluated,
      s"fsr=${fsr.evaluated} nfs=${nfs.evaluated}")
  }

  test("counters: generation time is far below evaluation time (Table I shape)") {
    val r = new Engine(data, tinyCfg("nfs"), None, None).run()
    assert(r.genMs < r.evalMs, s"gen=${r.genMs}ms eval=${r.evalMs}ms")
    assert(r.evalMs > 0)
  }

  test("regression datasets run through the same engine") {
    val reg = SyntheticTabular.generate(
      SyntheticTabular.Spec("engine-reg", 180, 4, classification = false, seed = 22))
    val r = new Engine(reg, tinyCfg("nfs"), None, None).run()
    assert(r.score >= 0.0 && r.score <= 1.0)
    assert(r.score >= r.baseScore)
  }
}
