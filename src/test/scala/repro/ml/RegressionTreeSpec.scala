package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class RegressionTreeSpec extends AnyFunSuite {

  /** Squared-error fitting: grad = pred0 - y with pred0 = 0, hess = 1. */
  private def fitSquared(x: Array[Array[Double]], y: Array[Double],
                         params: RegressionTree.Params = RegressionTree.Params(lambda = 0.0, minSamplesLeaf = 1))
      : RegressionTree.Tree =
    RegressionTree.fit(x, y.map(-_), Array.fill(y.length)(1.0),
      Array.tabulate(y.length)(identity), params)

  test("constant target yields a single leaf with that value") {
    val x = Array.tabulate(10)(i => Array(i.toDouble))
    val y = Array.fill(10)(3.0)
    val t = fitSquared(x, y)
    assert(t.numLeaves == 1)
    assert(math.abs(t.predict(Array(0.0)) - 3.0) < 1e-9)
  }

  test("perfect binary split on one feature is found") {
    val x = Array.tabulate(20)(i => Array(if (i < 10) 0.0 else 1.0))
    val y = Array.tabulate(20)(i => if (i < 10) -1.0 else 1.0)
    val t = fitSquared(x, y)
    assert(math.abs(t.predict(Array(0.0)) + 1.0) < 1e-9)
    assert(math.abs(t.predict(Array(1.0)) - 1.0) < 1e-9)
  }

  test("split picks the informative feature among noise") {
    val rng = new Random(0)
    val x = Array.tabulate(100)(i => Array(rng.nextDouble(), if (i % 2 == 0) 0.0 else 1.0, rng.nextDouble()))
    val y = Array.tabulate(100)(i => if (i % 2 == 0) 0.0 else 10.0)
    val t = fitSquared(x, y, RegressionTree.Params(maxDepth = 1, minSamplesLeaf = 5, lambda = 0.0))
    assert(t.root.feature == 1)
  }

  test("maxDepth bounds the tree depth") {
    val rng = new Random(1)
    val x = Array.tabulate(200)(_ => Array(rng.nextDouble(), rng.nextDouble()))
    val y = x.map(xi => xi(0) * 3 + xi(1))
    val t = fitSquared(x, y, RegressionTree.Params(maxDepth = 2, minSamplesLeaf = 1, lambda = 0.0))
    assert(t.depth <= 2)
  }

  test("minSamplesLeaf is respected") {
    val x = Array.tabulate(10)(i => Array(i.toDouble))
    val y = Array.tabulate(10)(_.toDouble)
    val t = fitSquared(x, y, RegressionTree.Params(maxDepth = 10, minSamplesLeaf = 3, lambda = 0.0))
    // with 10 samples and min 3 per leaf, at most 3 leaves
    assert(t.numLeaves <= 3)
  }

  test("leaf value is the second-order optimum -G/(H+lambda)") {
    val x = Array(Array(0.0), Array(0.0))
    val grad = Array(-2.0, -4.0) // G = -6
    val hess = Array(1.0, 1.0)   // H = 2
    val t = RegressionTree.fit(x, grad, hess, Array(0, 1),
      RegressionTree.Params(maxDepth = 0, lambda = 1.0))
    assert(math.abs(t.predict(Array(0.0)) - 2.0) < 1e-12) // 6/(2+1)
  }

  test("leafIndex maps distinct regions to distinct leaves") {
    val x = Array.tabulate(20)(i => Array(if (i < 10) 0.0 else 1.0))
    val y = Array.tabulate(20)(i => if (i < 10) -1.0 else 1.0)
    val t = fitSquared(x, y)
    val l0 = t.leafIndex(Array(0.0))
    val l1 = t.leafIndex(Array(1.0))
    assert(l0 != l1)
    assert(l0 < t.numLeaves && l1 < t.numLeaves)
  }

  test("leafValues array matches predictions") {
    val x = Array.tabulate(20)(i => Array(if (i < 10) 0.0 else 1.0))
    val y = Array.tabulate(20)(i => if (i < 10) -1.0 else 1.0)
    val t = fitSquared(x, y)
    Seq(Array(0.0), Array(1.0)).foreach { xi =>
      assert(t.leafValues(t.leafIndex(xi)) == t.predict(xi))
    }
  }

  test("xor pattern needs depth 2") {
    // NB: perfectly symmetric XOR has zero root gain and greedy CART
    // (like real XGBoost) refuses to split — replicate one corner once
    // more to break the symmetry.
    val x = Array(Array(0.0, 0.0), Array(0.0, 1.0), Array(1.0, 0.0), Array(1.0, 1.0))
      .flatMap(v => Array.fill(5)(v)) ++ Array(Array(0.0, 0.0))
    val y = x.map(v => if (v(0) != v(1)) 1.0 else -1.0)
    val shallow = fitSquared(x, y, RegressionTree.Params(maxDepth = 1, minSamplesLeaf = 1, lambda = 0.0))
    val deep = fitSquared(x, y, RegressionTree.Params(maxDepth = 2, minSamplesLeaf = 1, lambda = 0.0))
    def mse(t: RegressionTree.Tree) =
      x.zip(y).map { case (xi, yi) => math.pow(t.predict(xi) - yi, 2) }.sum / x.length
    assert(mse(deep) < 1e-9)
    assert(mse(shallow) > 0.5)
  }

  test("no split when all feature values identical") {
    val x = Array.fill(10)(Array(1.0))
    val y = Array.tabulate(10)(_.toDouble)
    val t = fitSquared(x, y)
    assert(t.numLeaves == 1)
  }

  test("lambda shrinks leaf values toward zero") {
    val x = Array.fill(4)(Array(0.0))
    val y = Array.fill(4)(1.0)
    val t0 = fitSquared(x, y, RegressionTree.Params(maxDepth = 0, lambda = 0.0))
    val t10 = fitSquared(x, y, RegressionTree.Params(maxDepth = 0, lambda = 10.0))
    assert(math.abs(t0.predict(Array(0.0))) > math.abs(t10.predict(Array(0.0))))
  }
}
