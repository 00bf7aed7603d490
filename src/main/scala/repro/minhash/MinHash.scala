package repro.minhash

import scala.util.hashing.MurmurHash3

/** MinHash Jaccard estimation over column value sets.
  *
  * Signatures are computed inside [[repro.core.Profiler]] as Spark
  * aggregations (`min(hash(value, i))` per permutation i); this object holds
  * the driver-side estimator plus a local signature builder for tests.
  */
object MinHash {

  /** Estimated Jaccard similarity: fraction of agreeing signature slots. */
  def estimate(a: Array[Long], b: Array[Long]): Double = {
    require(a.length == b.length && a.nonEmpty, "signatures must align")
    var agree = 0
    var i = 0
    while (i < a.length) { if (a(i) == b(i)) agree += 1; i += 1 }
    agree.toDouble / a.length
  }

  /** Local signature over a value set, mirroring the Spark aggregation:
    * slot i = min over values of murmur3(value, seed = i).
    */
  def signature(values: Iterable[String], k: Int): Array[Long] = {
    val sig = Array.fill(k)(Long.MaxValue)
    values.foreach { v =>
      var i = 0
      while (i < k) {
        // Matches Spark's Murmur3Hash over (string, int-literal) closely
        // enough for estimation purposes: hash value bytes with seed i.
        val h = MurmurHash3.bytesHash(v.getBytes("UTF-8"), i).toLong
        if (h < sig(i)) sig(i) = h
        i += 1
      }
    }
    sig
  }
}
