package repro.ml

import repro.SparkSpec

class MetricsSpec extends SparkSpec {

  test("accuracy of perfect predictions is 1") {
    assert(Metrics.accuracy(Array(0, 1, 1, 0), Array(0, 1, 1, 0)) === 1.0)
  }

  test("accuracy of all-wrong predictions is 0") {
    assert(Metrics.accuracy(Array(0, 1), Array(1, 0)) === 0.0)
  }

  test("accuracy counts elementwise matches") {
    assert(Metrics.accuracy(Array(0, 1, 1, 0), Array(0, 1, 0, 0)) === 0.75)
  }

  test("precision: TP/(TP+FP) hand-computed") {
    // preds: pos at idx 0,1,2; true pos at idx 0,1 → P = 2/3
    val yt = Array(1.0, 1.0, 0.0, 1.0)
    val yp = Array(1.0, 1.0, 1.0, 0.0)
    assert(math.abs(Metrics.precision(yt, yp, 1.0) - 2.0 / 3) < 1e-12)
  }

  test("recall: TP/(TP+FN) hand-computed") {
    val yt = Array(1.0, 1.0, 0.0, 1.0)
    val yp = Array(1.0, 1.0, 1.0, 0.0)
    assert(math.abs(Metrics.recall(yt, yp, 1.0) - 2.0 / 3) < 1e-12)
  }

  test("precision is 0 when nothing predicted positive") {
    assert(Metrics.precision(Array(1.0, 0.0), Array(0.0, 0.0), 1.0) === 0.0)
  }

  test("recall is 0 when class absent from truth") {
    assert(Metrics.recall(Array(0.0, 0.0), Array(1.0, 0.0), 1.0) === 0.0)
  }

  test("f1 is harmonic mean of precision and recall") {
    val yt = Array(1.0, 1.0, 0.0, 1.0)
    val yp = Array(1.0, 1.0, 1.0, 0.0)
    val p  = 2.0 / 3; val r = 2.0 / 3
    assert(math.abs(Metrics.f1(yt, yp, 1.0) - 2 * p * r / (p + r)) < 1e-12)
  }

  test("weighted F1 equals plain F1 average for balanced binary") {
    val yt = Array(1.0, 1.0, 0.0, 0.0)
    val yp = Array(1.0, 0.0, 0.0, 1.0)
    val expected = 0.5 * Metrics.f1(yt, yp, 1.0) + 0.5 * Metrics.f1(yt, yp, 0.0)
    assert(math.abs(Metrics.f1Weighted(yt, yp) - expected) < 1e-12)
  }

  test("weighted F1 of perfect multiclass prediction is 1") {
    val y = Array(0.0, 1.0, 2.0, 1.0, 0.0)
    assert(Metrics.f1Weighted(y, y.clone()) === 1.0)
  }

  test("1-rae of perfect regression is 1") {
    val y = Array(1.0, 2.0, 3.0)
    assert(Metrics.oneMinusRae(y, y.clone()) === 1.0)
  }

  test("1-rae of mean predictor is 0") {
    val y    = Array(1.0, 2.0, 3.0)
    val mean = Array.fill(3)(2.0)
    assert(Metrics.oneMinusRae(y, mean) === 0.0)
  }

  test("1-rae clamps catastrophic predictors at 0 (paper's 0.000 entries)") {
    val y   = Array(1.0, 2.0, 3.0)
    val bad = Array(100.0, -50.0, 42.0)
    assert(Metrics.oneMinusRae(y, bad) === 0.0)
  }

  test("1-rae hand-computed intermediate value") {
    val y  = Array(0.0, 2.0) // mean 1, denom = 2
    val yp = Array(0.5, 1.5) // num = 1
    assert(math.abs(Metrics.oneMinusRae(y, yp) - 0.5) < 1e-12)
  }

  test("metrics reject mismatched lengths") {
    intercept[IllegalArgumentException](Metrics.accuracy(Array(1.0), Array(1.0, 2.0)))
    intercept[IllegalArgumentException](Metrics.oneMinusRae(Array(1.0), Array(1.0, 2.0)))
  }
}
