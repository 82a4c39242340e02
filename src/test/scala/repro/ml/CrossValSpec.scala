package repro.ml

import repro.SparkSpec
import scala.util.Random

class CrossValSpec extends SparkSpec {

  test("folds partition all indices exactly once") {
    val y  = Array.fill(50)(Random.nextInt(2).toDouble)
    val fs = CrossVal.folds(y, 5, stratified = true, seed = 1)
    assert(fs.map(_.length).sum === 50)
    assert(fs.flatten.toSet.size === 50)
  }

  test("stratified folds balance classes across folds") {
    val y  = Array.fill(40)(1.0) ++ Array.fill(40)(0.0)
    val fs = CrossVal.folds(y, 4, stratified = true, seed = 2)
    fs.foreach { f =>
      val pos = f.count(y(_) == 1.0)
      assert(pos === 10, s"expected 10 positives per fold, got $pos")
    }
  }

  test("unstratified folds have near-equal sizes") {
    val y  = Array.fill(53)(0.0)
    val fs = CrossVal.folds(y, 5, stratified = false, seed = 3)
    assert(fs.map(_.length).max - fs.map(_.length).min <= 1)
  }

  test("folds are deterministic in the seed") {
    val y = Array.fill(30)(Random.nextInt(3).toDouble)
    val a = CrossVal.folds(y, 3, stratified = true, seed = 7).map(_.toSeq).toSeq
    val b = CrossVal.folds(y, 3, stratified = true, seed = 7).map(_.toSeq).toSeq
    assert(a === b)
  }

  test("folds rejects k < 2") {
    intercept[IllegalArgumentException](CrossVal.folds(Array(1.0), 1, stratified = false, 1))
  }

  test("CV score of separable data is near-perfect") {
    val rng = new Random(4)
    val x   = Array.fill(200)(Array(rng.nextGaussian()))
    val y   = x.map(r => if (r(0) > 0) 1.0 else 0.0)
    val s   = CrossVal.score(x, y, new RandomForest(classification = true), 3, 5)
    assert(s > 0.95, s"got $s")
  }

  test("CV score of pure-noise labels is near chance") {
    val rng = new Random(5)
    val x   = Array.fill(300)(Array(rng.nextGaussian(), rng.nextGaussian()))
    val y   = Array.fill(300)(rng.nextInt(2).toDouble)
    val s   = CrossVal.score(x, y, new RandomForest(classification = true, nTrees = 5), 3, 6)
    assert(s > 0.3 && s < 0.7, s"got $s")
  }

  test("CV score is deterministic") {
    val rng = new Random(6)
    val x   = Array.fill(100)(Array(rng.nextGaussian(), rng.nextGaussian()))
    val y   = x.map(r => if (r(0) > 0) 1.0 else 0.0)
    val s1  = CrossVal.score(x, y, new RandomForest(classification = true, seed = 9), 3, 9)
    val s2  = CrossVal.score(x, y, new RandomForest(classification = true, seed = 9), 3, 9)
    assert(s1 === s2)
  }

  test("CV clamps k to the sample count without crashing") {
    val x = Array(Array(1.0), Array(2.0), Array(3.0))
    val y = Array(0.0, 1.0, 0.0)
    val s = CrossVal.score(x, y, new RandomForest(classification = true, nTrees = 2), 10, 1)
    assert(s >= 0.0 && s <= 1.0)
  }

  test("regression CV uses 1-rae") {
    val rng = new Random(8)
    val x   = Array.fill(200)(Array(rng.nextDouble() * 10))
    val y   = x.map(r => 2 * r(0) + rng.nextGaussian() * 0.1)
    val s   = CrossVal.score(x, y, new RandomForest(classification = false, nTrees = 10), 3, 2)
    assert(s > 0.7, s"got $s")
  }
}
