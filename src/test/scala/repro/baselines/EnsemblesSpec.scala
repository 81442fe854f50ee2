package repro.baselines

import repro.SparkSpec
import repro.util.Rng

class EnsemblesSpec extends SparkSpec {

  /** Separable 2-class data with two informative features + one noise. */
  private def data(n: Int, seed: Long): (Array[Array[Double]], Array[Int]) = {
    val xs = Array.tabulate(n) { i =>
      val cls = i % 2
      Array(
        cls + 0.3 * Rng.gaussian(seed, i.toLong, 1L),
        -cls + 0.3 * Rng.gaussian(seed, i.toLong, 2L),
        Rng.uniform(seed, i.toLong, 3L),
      )
    }
    (xs, Array.tabulate(n)(_ % 2))
  }

  private def accuracy(clf: Ensembles.BinaryClassifier, xs: Array[Array[Double]], y: Array[Int]): Double =
    xs.indices.count(i => clf.predict(xs(i)) == (y(i) == 1)).toDouble / xs.length

  test("AdaBoost learns a separable problem") {
    val (xs, y) = data(200, 1L)
    val clf = Ensembles.adaBoost(xs, y, rounds = 30)
    assert(accuracy(clf, xs, y) > 0.9)
  }

  test("AdaBoost survives degenerate single-class data") {
    val xs = Array(Array(0.0), Array(1.0))
    val clf = Ensembles.adaBoost(xs, Array(1, 1), rounds = 5)
    assert(clf.predictProba(Array(0.5)) >= 0.0)
  }

  test("GBDT learns a separable problem") {
    val (xs, y) = data(200, 2L)
    val clf = Ensembles.gbdt(xs, y, rounds = 40)
    assert(accuracy(clf, xs, y) > 0.9)
  }

  test("GBDT probabilities are calibrated-ish at the extremes") {
    val (xs, y) = data(300, 3L)
    val clf = Ensembles.gbdt(xs, y, rounds = 40)
    val pPos = clf.predictProba(Array(1.0, -1.0, 0.5))
    val pNeg = clf.predictProba(Array(0.0, 0.0, 0.5))
    assert(pPos > 0.7, s"pos prob $pPos")
    assert(pNeg < 0.3, s"neg prob $pNeg")
  }

  test("Random forest learns a separable problem") {
    val (xs, y) = data(200, 4L)
    val clf = Ensembles.randomForest(xs, y, nTrees = 30)
    assert(accuracy(clf, xs, y) > 0.9)
  }

  test("Random forest probability is a vote share in [0,1]") {
    val (xs, y) = data(100, 5L)
    val clf = Ensembles.randomForest(xs, y, nTrees = 15)
    xs.take(20).foreach { x =>
      val p = clf.predictProba(x)
      assert(p >= 0.0 && p <= 1.0)
    }
  }

  test("XGBoost-like learns a separable problem") {
    val (xs, y) = data(200, 6L)
    val clf = Ensembles.xgbLike(xs, y, rounds = 40)
    assert(accuracy(clf, xs, y) > 0.9)
  }

  test("XGBoost-like regularisation shrinks predictions toward the prior") {
    val (xs, y) = data(100, 7L)
    val strong = Ensembles.xgbLike(xs, y, rounds = 10, lambda = 1000.0)
    val weak = Ensembles.xgbLike(xs, y, rounds = 10, lambda = 0.1)
    val probe = Array(1.0, -1.0, 0.5)
    assert(math.abs(strong.predictProba(probe) - 0.5) <
           math.abs(weak.predictProba(probe) - 0.5))
  }

  test("all four are deterministic") {
    val (xs, y) = data(120, 8L)
    assert(Ensembles.adaBoost(xs, y).predictProba(xs(0)) === Ensembles.adaBoost(xs, y).predictProba(xs(0)))
    assert(Ensembles.gbdt(xs, y).predictProba(xs(0)) === Ensembles.gbdt(xs, y).predictProba(xs(0)))
    assert(Ensembles.randomForest(xs, y).predictProba(xs(0)) === Ensembles.randomForest(xs, y).predictProba(xs(0)))
    assert(Ensembles.xgbLike(xs, y).predictProba(xs(0)) === Ensembles.xgbLike(xs, y).predictProba(xs(0)))
  }

  test("XOR problem needs depth: GBDT with depth-3 trees cracks it") {
    val xs = (for (a <- 0 to 1; b <- 0 to 1; r <- 0 until 25) yield
      Array(a + 0.05 * Rng.gaussian(9L, (a * 2 + b).toLong, r.toLong),
            b + 0.05 * Rng.gaussian(10L, (a * 2 + b).toLong, r.toLong))).toArray
    val y = xs.map(x => if ((x(0) > 0.5) != (x(1) > 0.5)) 1 else 0)
    val clf = Ensembles.gbdt(xs, y, rounds = 50, maxDepth = 3)
    assert(accuracy(clf, xs, y) > 0.95)
  }
}
