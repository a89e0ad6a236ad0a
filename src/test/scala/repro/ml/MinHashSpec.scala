package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class MinHashSpec extends AnyFunSuite {

  test("identical sets have similarity 1") {
    val mh = new MinHash(20, 1)
    val s = mh.signature(Seq(1L, 2L, 3L))
    assert(mh.similarity(s, s) == 1.0)
  }

  test("disjoint large sets have near-zero similarity") {
    val mh = new MinHash(64, 2)
    val a = mh.signature((1L to 100L))
    val b = mh.signature((1001L to 1100L))
    assert(mh.similarity(a, b) < 0.15)
  }

  test("signature length equals numHashes") {
    val mh = new MinHash(20, 3)
    assert(mh.signature(Seq(5L)).length == 20)
  }

  test("signatures are deterministic for a fixed seed") {
    val a = new MinHash(20, 4).signature(Seq(1L, 9L, 42L))
    val b = new MinHash(20, 4).signature(Seq(1L, 9L, 42L))
    assert(a.toSeq == b.toSeq)
  }

  test("different seeds give different hash families") {
    val a = new MinHash(20, 5).signature(1L to 50L)
    val b = new MinHash(20, 6).signature(1L to 50L)
    assert(a.toSeq != b.toSeq)
  }

  test("signature is order-independent") {
    val mh = new MinHash(20, 7)
    assert(mh.signature(Seq(3L, 1L, 2L)).toSeq == mh.signature(Seq(1L, 2L, 3L)).toSeq)
  }

  test("estimated similarity approximates true Jaccard") {
    val mh = new MinHash(256, 8)
    val rng = new Random(9)
    (0 until 10).foreach { _ =>
      val a = (0 until 80).map(_ => rng.nextInt(200).toLong).toSet
      val b = (0 until 80).map(_ => rng.nextInt(200).toLong).toSet
      val est = mh.similarity(mh.signature(a), mh.signature(b))
      val truth = MinHash.jaccard(a, b)
      assert(math.abs(est - truth) < 0.15, s"est=$est truth=$truth")
    }
  }

  test("exact jaccard helper") {
    assert(MinHash.jaccard(Set(1L, 2L), Set(2L, 3L)) == 1.0 / 3)
    assert(MinHash.jaccard(Set.empty, Set.empty) == 0.0)
  }

  test("negative ids are handled") {
    val mh = new MinHash(20, 10)
    val s = mh.signature(Seq(-5L, -1000000L))
    assert(s.forall(_ >= 0))
  }

  test("mismatched signature lengths throw") {
    val mh = new MinHash(20, 11)
    intercept[IllegalArgumentException] {
      mh.similarity(new Array[Long](20), new Array[Long](10))
    }
  }
}
