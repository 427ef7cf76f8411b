package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.TestGraphs

class BruteForceSpec extends AnyFunSuite {

  test("tiny graph, λ=2: the full V side is the only MFG") {
    val g = TestGraphs.tiny
    assert(BruteForce.mfgLabels(g, Params(2, 2, 2)) == Set(Set(0L, 1L, 2L)))
  }

  test("tiny graph, λ=3: only {v0,v1} stays frequent") {
    val g = TestGraphs.tiny
    assert(BruteForce.mfgLabels(g, Params(2, 2, 3)) == Set(Set(0L, 1L)))
  }

  test("tiny graph, τ_U=3: t2 has only two U vertices") {
    val g = TestGraphs.tiny
    assert(BruteForce.mfgLabels(g, Params(3, 2, 3)) == Set.empty[Set[Long]])
    assert(BruteForce.mfgLabels(g, Params(3, 2, 2)) == Set(Set(0L, 1L, 2L)))
  }

  test("τ_V filters out small maximal groups") {
    val g = TestGraphs.tiny
    // the maximal frequent set at λ=3 has size 2 < τ_V=3 → nothing reported
    assert(BruteForce.mfgLabels(g, Params(2, 3, 3)) == Set.empty[Set[Long]])
  }

  test("planted graph recovers the planted group") {
    val g = TestGraphs.planted
    assert(BruteForce.mfgLabels(g, Params(2, 2, 3)) == Set(Set(10L, 11L, 12L)))
  }

  test("frequency helper agrees with definition on planted graph") {
    val g = TestGraphs.planted
    assert(BruteForce.frequencyOf(g, Set(10L, 11L, 12L), 2) == 3)
    assert(BruteForce.frequencyOf(g, Set(10L, 11L), 2) == 3)
    assert(BruteForce.frequencyOf(g, Set(10L, 20L), 1) == 0)
  }

  test("antimonotone property holds on enumerated frequent sets (Lemma 2.2)") {
    val g = TestGraphs.random(6, 6, 4, 0.45, 7)
    val p = Params(2, 1, 2)
    val freq = BruteForce.allFrequentSets(g, p).map(_.toSet)
    val freqSet = freq.toSet
    for (s <- freq if s.size > 1; v <- s) {
      assert(freqSet.contains(s - v), s"subset ${s - v} of frequent $s missing")
    }
  }

  test("MFGs are mutually incomparable") {
    val g = TestGraphs.random(6, 6, 4, 0.5, 11)
    val p = Params(2, 1, 2)
    val mfgs = BruteForce.mfgs(g, p).toSeq
    for (a <- mfgs; b <- mfgs if a != b)
      assert(!a.toSet.subsetOf(b.toSet), s"$a ⊆ $b")
  }
}
