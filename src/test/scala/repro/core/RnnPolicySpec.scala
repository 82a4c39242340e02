package repro.core

import repro.SparkSpec
import scala.util.Random

class RnnPolicySpec extends SparkSpec {

  private def mkPolicy(seed: Long = 1) = new RnnPolicy(nActions = 9, seed = seed)

  test("forward returns a probability distribution") {
    val p              = mkPolicy()
    val (h, probs)     = p.forward(Array(0.1, 0.2, 0.3, 0.4), p.freshHidden)
    assert(math.abs(probs.sum - 1.0) < 1e-9)
    assert(probs.forall(_ >= 0))
    assert(h.length === p.hiddenDim)
    assert(h.forall(v => v >= -1 && v <= 1)) // tanh range
  }

  test("forward is deterministic given identical state") {
    val p  = mkPolicy(3)
    val x  = Array(0.5, 0.1, 0.0, 1.0)
    val a  = p.forward(x, p.freshHidden)._2
    val b  = p.forward(x, p.freshHidden)._2
    assert(a.sameElements(b))
  }

  test("hidden state carries information across steps") {
    val p  = mkPolicy(4)
    val x  = Array(0.5, 0.1, 0.0, 1.0)
    val (h1, p1) = p.forward(x, p.freshHidden)
    val (_, p2)  = p.forward(x, h1)
    assert(!p1.sameElements(p2)) // same input, different hidden → different dist
  }

  test("sample covers the support and is seed-deterministic") {
    val p     = mkPolicy(5)
    val probs = Array.fill(9)(1.0 / 9)
    val r1    = new Random(42)
    val r2    = new Random(42)
    val s1    = (0 until 100).map(_ => p.sample(probs, r1))
    val s2    = (0 until 100).map(_ => p.sample(probs, r2))
    assert(s1 === s2)
    assert(s1.distinct.size > 4) // uniform sampling hits many actions
    assert(s1.forall(a => a >= 0 && a < 9))
  }

  test("sample of a near-deterministic distribution picks its mode") {
    val p     = mkPolicy(6)
    val probs = Array.fill(9)(1e-9); probs(3) = 1.0 - 8e-9
    val r     = new Random(1)
    assert((0 until 50).forall(_ => p.sample(probs, r) === 3))
  }

  test("REINFORCE increases the probability of a positively-rewarded action") {
    val p = mkPolicy(7)
    val x = Array(0.2, 0.5, 0.0, 0.5)
    val before = p.forward(x, p.freshHidden)._2(2)
    for (_ <- 0 until 30) {
      p.update(Seq(PolicyStep(x, p.freshHidden, 2)), Seq(1.0))
    }
    val after = p.forward(x, p.freshHidden)._2(2)
    assert(after > before, s"before=$before after=$after")
  }

  test("REINFORCE decreases the probability of a negatively-rewarded action") {
    val p = mkPolicy(8)
    val x = Array(0.2, 0.5, 0.0, 0.5)
    val before = p.forward(x, p.freshHidden)._2(4)
    for (_ <- 0 until 30) {
      p.update(Seq(PolicyStep(x, p.freshHidden, 4)), Seq(-1.0))
    }
    val after = p.forward(x, p.freshHidden)._2(4)
    assert(after < before, s"before=$before after=$after")
  }

  test("update with empty episode is a no-op") {
    val p  = mkPolicy(9)
    val w0 = p.wo.clone()
    p.update(Seq.empty, Seq.empty)
    assert(p.wo.sameElements(w0))
  }

  test("update rejects mismatched lengths") {
    val p = mkPolicy(10)
    intercept[IllegalArgumentException] {
      p.update(Seq(PolicyStep(Array(0.0, 0, 0, 0), p.freshHidden, 0)), Seq(1.0, 2.0))
    }
  }

  test("discounted returns: geometric accumulation") {
    val u = Returns.discounted(Seq(1.0, 1.0, 1.0), gamma = 0.5)
    assert(math.abs(u(2) - 1.0) < 1e-12)
    assert(math.abs(u(1) - 1.5) < 1e-12)
    assert(math.abs(u(0) - 1.75) < 1e-12)
  }

  test("discounted returns with gamma 0 are the raw rewards") {
    val r = Seq(0.3, -0.2, 0.9)
    assert(Returns.discounted(r, 0.0).toSeq === r)
  }

  test("lambda returns with lambda→1 approach the full monte-carlo return") {
    val r  = Seq(1.0, 2.0, 3.0)
    val mc = Returns.discounted(r, 0.9)
    val lr = Returns.lambdaReturns(r, 0.9, 0.999999)
    mc.zip(lr).foreach { case (a, b) => assert(math.abs(a - b) < 1e-3, s"$a vs $b") }
  }

  test("lambda returns with lambda 0 reduce to one-step rewards") {
    val r  = Seq(1.0, 2.0, 3.0)
    val lr = Returns.lambdaReturns(r, 0.9, 0.0)
    r.zip(lr).foreach { case (a, b) => assert(math.abs(a - b) < 1e-12) }
  }

  test("lambda returns of an all-zero episode are zero") {
    assert(Returns.lambdaReturns(Seq(0.0, 0.0), 0.9, 0.8).forall(_ === 0.0))
  }
}
