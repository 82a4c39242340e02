package repro.ml

import repro.SparkSpec
import scala.util.Random

/** Sanity coverage for the Table V swap models: SVM, NB, GP, Ridge. */
class ClassifiersSpec extends SparkSpec {

  private def separable(n: Int, seed: Long): (Array[Array[Double]], Array[Double]) = {
    val rng = new Random(seed)
    val x   = Array.fill(n)(Array(rng.nextGaussian(), rng.nextGaussian()))
    val y   = x.map(r => if (r(0) + 0.5 * r(1) > 0) 1.0 else 0.0)
    (x, y)
  }

  test("LinearSVM separates a linear boundary") {
    val (x, y) = separable(300, 21)
    val m      = new LinearSVM().fit(x, y)
    assert(Metrics.accuracy(y, x.map(m.predict)) > 0.93)
  }

  test("LinearSVM handles three classes one-vs-rest") {
    val rng = new Random(22)
    val x   = Array.fill(300)(Array(rng.nextGaussian() * 4))
    val y   = x.map(r => if (r(0) < -1.5) 0.0 else if (r(0) < 1.5) 1.0 else 2.0)
    val m   = new LinearSVM().fit(x, y)
    assert(Metrics.accuracy(y, x.map(m.predict)) > 0.85)
  }

  test("LinearSVM is scale-invariant thanks to standardization") {
    val (x, y) = separable(200, 23)
    val xs     = x.map(r => Array(r(0) * 1e4, r(1) * 1e-4))
    val m      = new LinearSVM().fit(xs, y)
    assert(Metrics.accuracy(y, xs.map(m.predict)) > 0.9)
  }

  test("NaiveBayes separates class-conditional gaussians") {
    val rng = new Random(24)
    val x = Array.fill(300) {
      val c = rng.nextInt(2)
      Array(c * 3.0 + rng.nextGaussian(), -c * 3.0 + rng.nextGaussian())
    }
    val y = x.map(r => if (r(0) > 1.5) 1.0 else 0.0)
    val m = new NaiveBayes().fit(x, y)
    assert(Metrics.accuracy(y, x.map(m.predict)) > 0.9)
  }

  test("NaiveBayes respects class priors on degenerate features") {
    val x = Array.fill(100)(Array(1.0)) // uninformative constant feature
    val y = Array.fill(80)(1.0) ++ Array.fill(20)(0.0)
    val m = new NaiveBayes().fit(x, y)
    assert(m.predict(Array(1.0)) === 1.0)
  }

  test("GaussianProcess fits a nonlinear function") {
    val rng = new Random(25)
    val x   = Array.fill(200)(Array(rng.nextDouble() * 6 - 3))
    val y   = x.map(r => math.sin(r(0)))
    val m   = new GaussianProcess(seed = 1).fit(x, y)
    val s   = Metrics.oneMinusRae(y, x.map(m.predict))
    assert(s > 0.8, s"got $s")
  }

  test("GaussianProcess subsamples very large inputs without crashing") {
    val rng = new Random(26)
    val x   = Array.fill(900)(Array(rng.nextDouble()))
    val y   = x.map(r => r(0) * 2)
    val m   = new GaussianProcess(maxTrain = 100, seed = 1).fit(x, y)
    assert(Metrics.oneMinusRae(y, x.map(m.predict)) > 0.7)
  }

  test("RidgeRegression recovers linear coefficients") {
    val rng = new Random(27)
    val x   = Array.fill(300)(Array(rng.nextGaussian(), rng.nextGaussian()))
    val y   = x.map(r => 3 * r(0) - 2 * r(1) + 1 + rng.nextGaussian() * 0.01)
    val m   = new RidgeRegression(alpha = 1e-4).fit(x, y)
    assert(Metrics.oneMinusRae(y, x.map(m.predict)) > 0.97)
  }

  test("RidgeRegression tolerates constant columns") {
    val x = Array.tabulate(50)(i => Array(i.toDouble, 7.0))
    val y = x.map(_(0) * 2)
    val m = new RidgeRegression().fit(x, y)
    assert(Metrics.oneMinusRae(y, x.map(m.predict)) > 0.95)
  }

  test("learner metric dispatches by task type") {
    val svm = new LinearSVM()
    assert(svm.metric(Array(1.0, 0.0), Array(1.0, 0.0)) === 1.0)
    val gp = new GaussianProcess()
    assert(gp.metric(Array(1.0, 2.0, 3.0), Array(1.0, 2.0, 3.0)) === 1.0)
  }
}
