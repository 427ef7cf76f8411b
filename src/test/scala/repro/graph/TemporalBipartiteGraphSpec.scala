package repro.graph

import org.scalatest.funsuite.AnyFunSuite

import repro.TestGraphs

class TemporalBipartiteGraphSpec extends AnyFunSuite {

  private val g = TestGraphs.of(
    (1, 10, 0), (1, 11, 0), (2, 10, 0),
    (1, 10, 1), (2, 11, 1),
    (1, 10, 0), // duplicate — must be dropped
  )

  test("dimensions from labels") {
    assert(g.nU == 2 && g.nV == 2 && g.nT == 2)
    assert(g.uLabels.toSeq == Seq(1L, 2L))
    assert(g.vLabels.toSeq == Seq(10L, 11L))
    assert(g.tLabels.toSeq == Seq(0L, 1L))
  }

  test("duplicate temporal edges are dropped") {
    assert(g.temporalEdgeCount == 5)
  }

  test("static edge count collapses timestamps") {
    // static edges: (1,10), (1,11), (2,10), (2,11)
    assert(g.staticEdgeCount == 4)
  }

  test("structural degrees (Definition 2.1)") {
    assert(g.sDegU(0) == 2) // u=1 connects v=10,11
    assert(g.sDegU(1) == 2) // u=2 connects v=10 (t0) and v=11 (t1)
    assert(g.sDegV(0) == 2 && g.sDegV(1) == 2)
  }

  test("momentary degrees and neighbors (Definition 2.2)") {
    assert(g.mDegU(0, 0) == 2) // u=1 at t=0: v=10,11
    assert(g.mDegU(0, 1) == 1) // u=1 at t=1: v=10
    assert(g.gammaV(0)(0).toSeq == Seq(0, 1)) // v=10 at t=0: u=1,2
    assert(g.gammaV(1)(1).toSeq == Seq(1))    // v=11 at t=1: u=2
  }

  test("per-edge timestamp lists are sorted and complete") {
    // u=1 (internal 0) — v=10 (internal 0) at timestamps 0 and 1
    val i = g.uAdj(0).indexOf(0)
    assert(g.uAdjTs(0)(i).toSeq == Seq(0, 1))
  }

  test("internalEdges round-trips the edge set") {
    assert(g.internalEdges.toSet ==
      Set((0, 0, 0), (0, 1, 0), (1, 0, 0), (0, 0, 1), (1, 1, 1)))
  }

  test("labeledEdges maps back to original labels") {
    assert(g.labeledEdges.toSet ==
      Set((1L, 10L, 0L), (1L, 11L, 0L), (2L, 10L, 0L), (1L, 10L, 1L), (2L, 11L, 1L)))
  }

  test("relabelV permutes ids and labels consistently") {
    val r = g.relabelV(Array(1, 0)) // new id 0 = old id 1 (label 11)
    assert(r.vLabels.toSeq == Seq(11L, 10L))
    assert(r.labeledEdges.toSet == g.labeledEdges.toSet)
  }

  test("collapseStatic merges all snapshots into t=0") {
    val s = g.collapseStatic
    assert(s.nT == 1)
    assert(s.temporalEdgeCount == 4)
    assert(s.mDegU(0, 0) == 2 && s.mDegU(1, 0) == 2)
  }

  test("fromInternal allows isolated vertices and empty timestamps") {
    val h = TemporalBipartiteGraph.fromInternal(3, 3, 3, Array((0, 0, 0)),
      Array(0L, 1L, 2L), Array(0L, 1L, 2L), Array(0L, 1L, 2L))
    assert(h.sDegU(2) == 0 && h.sDegV(2) == 0 && h.mDegV(0, 2) == 0)
    assert(h.temporalEdgeCount == 1)
  }

  test("fromInternal rejects out-of-range edges") {
    intercept[IllegalArgumentException] {
      TemporalBipartiteGraph.fromInternal(1, 1, 1, Array((0, 5, 0)), Array(0L), Array(0L), Array(0L))
    }
  }

  for (seed <- 0 until 10) {
    test(s"random graph invariants (seed $seed)") {
      val g = TestGraphs.random(5, 6, 4, 0.3, seed)
      // adjacency symmetry between the two CSR views
      for (u <- 0 until g.nU; (v, i) <- g.uAdj(u).zipWithIndex) {
        val j = g.vAdj(v).indexOf(u)
        assert(j >= 0, s"v $v missing back-edge to u $u")
        assert(g.uAdjTs(u)(i).toSeq == g.vAdjTs(v)(j).toSeq)
      }
      // snapshot adjacency consistent with timestamp lists
      for (u <- 0 until g.nU; (v, i) <- g.uAdj(u).zipWithIndex; t <- g.uAdjTs(u)(i)) {
        assert(g.gammaU(t)(u).contains(v))
        assert(g.gammaV(t)(v).contains(u))
      }
      // sorted adjacency
      for (t <- 0 until g.nT; u <- 0 until g.nU)
        assert(g.gammaU(t)(u).toSeq == g.gammaU(t)(u).toSeq.sorted)
    }
  }
}
