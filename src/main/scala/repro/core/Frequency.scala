package repro.core

import repro.graph.{SortedOps, TemporalBipartiteGraph}

/** Frequency-verification machinery: the naive per-timestamp intersection
  * check (used by BK-ALG and the FilterV-VM ablation), the array-based
  * CheckFRE of Algorithm 3, and the T(v) bitsets behind the candidate
  * filtering rule of Lemma 3.2.
  */
object Frequency {

  /** Naive frequency verification: for each timestamp intersect the
    * m-neighbor lists of all vertices in `vs` and count timestamps where the
    * common m-neighbor count reaches τ_U. Early-exits once `lambda` support
    * timestamps are found or become unreachable.
    */
  object NaiveFreq {

    /** Sorted common m-neighbors ∩_{v∈vs} Γ(v, t). */
    def commonMNeighbors(g: TemporalBipartiteGraph, vs: Array[Int], t: Int): Array[Int] = {
      if (vs.isEmpty) return Array.range(0, g.nU)
      var acc = g.gammaV(t)(vs(0))
      var i = 1
      while (i < vs.length && acc.nonEmpty) { acc = SortedOps.intersect(acc, g.gammaV(t)(vs(i))); i += 1 }
      acc
    }

    /** true iff `vs` has ≥ λ support timestamps with ≥ τ_U common m-neighbors. */
    def isFrequent(g: TemporalBipartiteGraph, vs: Array[Int], tauU: Int, lambda: Int): Boolean = {
      var found = 0
      var t = 0
      while (t < g.nT) {
        if (commonMNeighbors(g, vs, t).length >= tauU) {
          found += 1
          if (found >= lambda) return true
        }
        // not enough timestamps left to still reach lambda
        if (found + (g.nT - t - 1) < lambda) return false
        t += 1
      }
      false
    }

    /** All support timestamps of `vs` (no early exit; used by tests/oracles). */
    def supportTimestamps(g: TemporalBipartiteGraph, vs: Array[Int], tauU: Int): Array[Int] =
      Array.range(0, g.nT).filter(t => commonMNeighbors(g, vs, t).length >= tauU)
  }

  /** Array-based frequency verification (Algorithm 3).
    *
    * Holds one Reborn Array and one Update Array of length |T| which are
    * reused across calls, exactly as the paper's structures. Not
    * thread-safe — allocate one instance per search thread/partition.
    */
  final class CheckFre(g: TemporalBipartiteGraph) extends Serializable {
    private val ra = new Array[Int](g.nT) // Reborn Array: u's m-neighbors in V_S per t
    private val ua = new Array[Int](g.nT) // Update Array: common m-neighbors of V_S per t

    /** Algorithm 3: returns true iff V_S (given via membership flags and
      * size) has ≥ λ support timestamps. `us` holds the common s-neighbors
      * of V_S (only its first `usLen` entries are read).
      */
    def frequent(us: Array[Int], usLen: Int, vsMember: Array[Boolean], vsSize: Int,
                 tauU: Int, lambda: Int): Boolean = {
      java.util.Arrays.fill(ua, 0)
      var i = 0
      while (i < usLen) {
        val u = us(i)
        java.util.Arrays.fill(ra, 0)
        val nbrs = g.uAdj(u)
        val tss = g.uAdjTs(u)
        var j = 0
        while (j < nbrs.length) {
          if (vsMember(nbrs(j))) {
            val ts = tss(j); var k = 0
            while (k < ts.length) { ra(ts(k)) += 1; k += 1 }
          }
          j += 1
        }
        var t = 0
        while (t < g.nT) { if (ra(t) == vsSize) ua(t) += 1; t += 1 }
        i += 1
      }
      var cnt = 0
      var t = 0
      while (t < g.nT) {
        if (ua(t) >= tauU) { cnt += 1; if (cnt >= lambda) return true }
        t += 1
      }
      false
    }
  }

  /** T(v) bitsets for the candidate filtering rule (Lemma 3.2):
    * T(v) = { t : δ(v,t) ≥ τ_U } packed into Long words, so the rule
    * |∩_{v∈V_S∪{v'}} T(v)| < λ is a popcount over an AND.
    */
  final class TBits(g: TemporalBipartiteGraph, tauU: Int) extends Serializable {
    val words: Int = (g.nT + 63) >>> 6
    /** v -> bitset of timestamps where δ(v,t) ≥ τ_U. */
    val bits: Array[Array[Long]] = Array.tabulate(g.nV) { v =>
      val b = new Array[Long](words)
      var t = 0
      while (t < g.nT) { if (g.mDegV(v, t) >= tauU) b(t >>> 6) |= 1L << (t & 63); t += 1 }
      b
    }

    /** Bitset with every timestamp set (the T-intersection of V_S = ∅). */
    def full: Array[Long] = {
      val b = Array.fill(words)(-1L)
      val rem = g.nT & 63
      if (words > 0 && rem != 0) b(words - 1) = (1L << rem) - 1
      b
    }

    def and(a: Array[Long], b: Array[Long]): Array[Long] = {
      val out = new Array[Long](words)
      var i = 0
      while (i < words) { out(i) = a(i) & b(i); i += 1 }
      out
    }

    /** popcount(a & b) with early exit once `atLeast` is reached. */
    def andCountAtLeast(a: Array[Long], b: Array[Long], atLeast: Int): Boolean = {
      var c = 0
      var i = 0
      while (i < words) {
        c += java.lang.Long.bitCount(a(i) & b(i))
        if (c >= atLeast) return true
        i += 1
      }
      false
    }
  }
}
