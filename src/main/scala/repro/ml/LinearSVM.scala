package repro.ml

import scala.util.Random

/** Linear SVM trained with hinge-loss SGD; multi-class via one-vs-rest.
  * Used as a swap-in downstream task for Table V ("SVM" column).
  *
  * Features are standardized internally (mean 0, std 1) so the fixed
  * learning rate behaves across datasets of very different scales.
  */
final class LinearSVM(
    val classification: Boolean = true,
    val epochs: Int = 60,
    val lr: Double = 0.05,
    val reg: Double = 1e-3,
    val seed: Long = 13L,
) extends Learner {

  override def isClassifier: Boolean = true

  private final class SvmModel(
      ws: Array[(Double, Array[Double], Double)], // (classLabel, weights, bias)
      mean: Array[Double],
      std: Array[Double],
  ) extends Model {
    override def predict(x: Array[Double]): Double = {
      val z = Array.tabulate(x.length)(j => (x(j) - mean(j)) / std(j))
      ws.map { case (label, w, b) =>
        var s = b
        var j = 0
        while (j < z.length) { s += w(j) * z(j); j += 1 }
        (label, s)
      }.maxBy { case (label, s) => (s, -label) }._1
    }
  }

  override def fit(x: Array[Array[Double]], y: Array[Double]): Model = {
    require(x.nonEmpty && x.length == y.length, "empty or mismatched training data")
    val p    = x(0).length
    val n    = x.length
    val mean = Array.tabulate(p)(j => x.map(_(j)).sum / n)
    val std = Array.tabulate(p) { j =>
      val v = x.map(r => { val d = r(j) - mean(j); d * d }).sum / n
      val s = math.sqrt(v)
      if (s < 1e-9) 1.0 else s
    }
    val z       = x.map(r => Array.tabulate(p)(j => (r(j) - mean(j)) / std(j)))
    val classes = y.distinct.sorted
    val rng     = new Random(seed)
    val models = classes.map { c =>
      val t = y.map(v => if (v == c) 1.0 else -1.0)
      val w = Array.fill(p)(0.0)
      var b = 0.0
      for (e <- 0 until epochs) {
        val order = rng.shuffle((0 until n).toList)
        val step  = lr / (1.0 + 0.1 * e)
        order.foreach { i =>
          var s = b
          var j = 0
          while (j < p) { s += w(j) * z(i)(j); j += 1 }
          if (t(i) * s < 1.0) {
            var k = 0
            while (k < p) { w(k) += step * (t(i) * z(i)(k) - reg * w(k)); k += 1 }
            b += step * t(i)
          } else {
            var k = 0
            while (k < p) { w(k) -= step * reg * w(k); k += 1 }
          }
        }
      }
      (c, w, b)
    }
    new SvmModel(models, mean, std)
  }
}
