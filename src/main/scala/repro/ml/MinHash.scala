package repro.ml

import scala.util.Random

/** Min-hash signatures for Jaccard similarity estimation — the structural
  * similarity machinery of the ProbWP baseline [Aggarwal et al., ICDE'16],
  * which the paper configures with 20 hash functions. */
final class MinHash(val numHashes: Int, seed: Long) extends Serializable {
  // Mersenne prime 2^31-1: operands stay < 2^31, products < 2^62, no overflow.
  private val P = 2147483647L

  private val (as, bs) = {
    val rng = new Random(seed)
    val a = Array.fill(numHashes)(1L + math.abs(rng.nextLong()) % (P - 1))
    val b = Array.fill(numHashes)(math.abs(rng.nextLong()) % P)
    (a, b)
  }

  /** Signature of a set of Long elements; empty sets get Long.MaxValue in
    * every slot (so two empty sets look identical — callers should guard). */
  def signature(set: Iterable[Long]): Array[Long] = {
    val sig = Array.fill(numHashes)(Long.MaxValue)
    set.foreach { x =>
      val xm = ((x % P) + P) % P
      var i = 0
      while (i < numHashes) {
        val h = (as(i) * xm + bs(i)) % P
        if (h < sig(i)) sig(i) = h
        i += 1
      }
    }
    sig
  }

  /** Estimated Jaccard similarity = fraction of matching signature slots. */
  def similarity(sigA: Array[Long], sigB: Array[Long]): Double = {
    require(sigA.length == numHashes && sigB.length == numHashes)
    var matches = 0
    var i = 0
    while (i < numHashes) { if (sigA(i) == sigB(i)) matches += 1; i += 1 }
    matches.toDouble / numHashes
  }
}

object MinHash {
  /** Exact Jaccard, for tests and small sets. */
  def jaccard(a: Set[Long], b: Set[Long]): Double = {
    val union = (a ++ b).size
    if (union == 0) 0.0 else (a & b).size.toDouble / union
  }
}
