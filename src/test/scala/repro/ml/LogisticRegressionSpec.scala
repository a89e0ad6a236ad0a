package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class LogisticRegressionSpec extends AnyFunSuite {

  private def linearData(n: Int, seed: Int): (Array[Array[Double]], Array[String]) = {
    val rng = new Random(seed)
    val x = Array.tabulate(n)(_ => Array(rng.nextGaussian(), rng.nextGaussian()))
    val y = x.map(xi => if (xi(0) + xi(1) > 0) "pos" else "neg")
    (x, y)
  }

  test("linearly separable data is fit accurately") {
    val (x, y) = linearData(200, 0)
    val m = LogisticRegression.train(x, y)
    val acc = x.zip(y).count { case (xi, yi) => m.predictLabel(xi) == yi }.toDouble / x.length
    assert(acc > 0.95, s"accuracy $acc")
  }

  test("probabilities sum to one") {
    val (x, y) = linearData(50, 1)
    val m = LogisticRegression.train(x, y)
    assert(math.abs(m.predictProba(x(0)).sum - 1.0) < 1e-9)
  }

  test("three classes are handled") {
    val rng = new Random(2)
    val centers = Array((0.0, 0.0), (5.0, 0.0), (0.0, 5.0))
    val x = Array.tabulate(150) { i =>
      val c = centers(i % 3)
      Array(c._1 + rng.nextGaussian() * 0.4, c._2 + rng.nextGaussian() * 0.4)
    }
    val y = Array.tabulate(150)(i => s"c${i % 3}")
    val m = LogisticRegression.train(x, y)
    val acc = x.zip(y).count { case (xi, yi) => m.predictLabel(xi) == yi }.toDouble / x.length
    assert(acc > 0.95)
  }

  test("classes are sorted") {
    val (x, y) = linearData(40, 3)
    assert(LogisticRegression.train(x, y).classes.toSeq == Seq("neg", "pos"))
  }

  test("unscaled features are handled via internal standardization") {
    val rng = new Random(4)
    val x = Array.tabulate(200)(_ => Array(rng.nextGaussian() * 1000 + 5000, rng.nextGaussian() * 0.001))
    val y = x.map(xi => if (xi(0) > 5000) "hi" else "lo")
    val m = LogisticRegression.train(x, y)
    val acc = x.zip(y).count { case (xi, yi) => m.predictLabel(xi) == yi }.toDouble / x.length
    assert(acc > 0.9)
  }

  test("constant feature column does not blow up") {
    val x = Array.tabulate(40)(i => Array(1.0, if (i % 2 == 0) 0.0 else 1.0))
    val y = x.map(xi => if (xi(1) == 0.0) "a" else "b")
    val m = LogisticRegression.train(x, y)
    assert(m.predictLabel(Array(1.0, 0.0)) == "a")
    assert(m.predictLabel(Array(1.0, 1.0)) == "b")
  }

  test("training is deterministic") {
    val (x, y) = linearData(60, 5)
    val a = LogisticRegression.train(x, y).predictProba(x(0))
    val b = LogisticRegression.train(x, y).predictProba(x(0))
    assert(a.toSeq == b.toSeq)
  }

  test("stronger L2 pulls probabilities toward uniform") {
    val (x, y) = linearData(100, 6)
    val weak = LogisticRegression.train(x, y, LogisticRegression.Params(l2 = 1e-6))
    val strong = LogisticRegression.train(x, y, LogisticRegression.Params(l2 = 10.0))
    val pw = weak.predictProba(Array(3.0, 3.0)).max
    val ps = strong.predictProba(Array(3.0, 3.0)).max
    assert(ps < pw)
  }

  test("empty training data throws") {
    intercept[IllegalArgumentException] {
      LogisticRegression.train(Array.empty, Array.empty)
    }
  }

  test("model is java-serializable") {
    val (x, y) = linearData(40, 7)
    val m = LogisticRegression.train(x, y)
    val bos = new java.io.ByteArrayOutputStream()
    new java.io.ObjectOutputStream(bos).writeObject(m)
    val m2 = new java.io.ObjectInputStream(
      new java.io.ByteArrayInputStream(bos.toByteArray)).readObject().asInstanceOf[LogisticRegression.Model]
    assert(m2.predictLabel(x(0)) == m.predictLabel(x(0)))
  }
}
