package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class GBDTSpec extends AnyFunSuite {

  private def blobs(n: Int, seed: Int): (Array[Array[Double]], Array[String]) = {
    val rng = new Random(seed)
    val x = Array.newBuilder[Array[Double]]
    val y = Array.newBuilder[String]
    (0 until n).foreach { i =>
      val c = i % 3
      val center = c match {
        case 0 => (0.0, 0.0)
        case 1 => (4.0, 0.0)
        case _ => (0.0, 4.0)
      }
      x += Array(center._1 + rng.nextGaussian() * 0.5, center._2 + rng.nextGaussian() * 0.5)
      y += s"c$c"
    }
    (x.result(), y.result())
  }

  test("classes are discovered and sorted") {
    val (x, y) = blobs(30, 0)
    val m = GBDT.train(x, y, GBDT.Params(numRounds = 3))
    assert(m.classes.toSeq == Seq("c0", "c1", "c2"))
  }

  test("separable blobs are classified almost perfectly") {
    val (x, y) = blobs(150, 1)
    val m = GBDT.train(x, y, GBDT.Params(numRounds = 20))
    val acc = x.zip(y).count { case (xi, yi) => m.predictLabel(xi) == yi }.toDouble / x.length
    assert(acc > 0.95, s"train accuracy $acc")
  }

  test("generalizes to held-out blob points") {
    val (xTr, yTr) = blobs(150, 2)
    val (xTe, yTe) = blobs(60, 3)
    val m = GBDT.train(xTr, yTr, GBDT.Params(numRounds = 20))
    val acc = xTe.zip(yTe).count { case (xi, yi) => m.predictLabel(xi) == yi }.toDouble / xTe.length
    assert(acc > 0.9, s"test accuracy $acc")
  }

  test("predictProba sums to 1 and is in [0,1]") {
    val (x, y) = blobs(60, 4)
    val m = GBDT.train(x, y, GBDT.Params(numRounds = 5))
    val p = m.predictProba(x(0))
    assert(math.abs(p.sum - 1.0) < 1e-9)
    p.foreach(v => assert(v >= 0 && v <= 1))
  }

  test("probability of the true class grows with boosting rounds") {
    val (x, y) = blobs(90, 5)
    val m2 = GBDT.train(x, y, GBDT.Params(numRounds = 2))
    val m20 = GBDT.train(x, y, GBDT.Params(numRounds = 20))
    def meanTrueProb(m: GBDT.Model) = {
      val idx = m.classes.zipWithIndex.toMap
      x.zip(y).map { case (xi, yi) => m.predictProba(xi)(idx(yi)) }.sum / x.length
    }
    assert(meanTrueProb(m20) > meanTrueProb(m2))
  }

  test("binary problem works") {
    val x = Array.tabulate(40)(i => Array(if (i % 2 == 0) 0.0 else 1.0))
    val y = x.map(xi => if (xi(0) == 0.0) "no" else "yes")
    val m = GBDT.train(x, y, GBDT.Params(numRounds = 10))
    assert(m.predictLabel(Array(0.0)) == "no")
    assert(m.predictLabel(Array(1.0)) == "yes")
  }

  test("xor is learned (trees of depth >= 2)") {
    // replicate one corner once more: perfectly symmetric XOR has zero
    // root gain, and greedy boosting (like real XGBoost) never splits
    val pts = Array(Array(0.0, 0.0), Array(0.0, 1.0), Array(1.0, 0.0), Array(1.0, 1.0))
    val x = pts.flatMap(p => Array.fill(8)(p)) ++ Array(Array(0.0, 0.0))
    val y = x.map(p => if (p(0) != p(1)) "odd" else "even")
    val m = GBDT.train(x, y, GBDT.Params(numRounds = 20, maxDepth = 2, minSamplesLeaf = 1))
    pts.foreach { p =>
      val expected = if (p(0) != p(1)) "odd" else "even"
      assert(m.predictLabel(p) == expected, p.toSeq)
    }
  }

  test("leafEmbedding has numRounds * numClasses entries") {
    val (x, y) = blobs(30, 6)
    val m = GBDT.train(x, y, GBDT.Params(numRounds = 7))
    assert(m.leafEmbedding(x(0)).length == 7 * 3)
  }

  test("leafEmbedding differs across well-separated classes") {
    val (x, y) = blobs(90, 7)
    val m = GBDT.train(x, y, GBDT.Params(numRounds = 10))
    val e0 = m.leafEmbedding(Array(0.0, 0.0))
    val e1 = m.leafEmbedding(Array(4.0, 0.0))
    assert(e0.toSeq != e1.toSeq)
  }

  test("training is deterministic") {
    val (x, y) = blobs(60, 8)
    val a = GBDT.train(x, y, GBDT.Params(numRounds = 5)).predictProba(x(0))
    val b = GBDT.train(x, y, GBDT.Params(numRounds = 5)).predictProba(x(0))
    assert(a.toSeq == b.toSeq)
  }

  test("empty training data throws") {
    intercept[IllegalArgumentException] {
      GBDT.train(Array.empty, Array.empty)
    }
  }

  test("model is java-serializable (Spark broadcast requirement)") {
    val (x, y) = blobs(30, 9)
    val m = GBDT.train(x, y, GBDT.Params(numRounds = 3))
    val bos = new java.io.ByteArrayOutputStream()
    new java.io.ObjectOutputStream(bos).writeObject(m)
    val m2 = new java.io.ObjectInputStream(
      new java.io.ByteArrayInputStream(bos.toByteArray)).readObject().asInstanceOf[GBDT.Model]
    assert(m2.predictLabel(x(0)) == m.predictLabel(x(0)))
  }
}
