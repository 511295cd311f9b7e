package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.core.Hypergraph

class IHSFilterSpec extends AnyFunSuite {

  private val h = Hypergraph.fig1Data
  private val q = Hypergraph.fig1Query
  private val dIdx = new IHSIndex(h)
  private val qIdx = new IHSIndex(q)

  test("label mismatch is rejected") {
    // u4 has label B(1); v0 has label A(0)
    assert(!IHSFilter.admits(qIdx, dIdx, 4, 0))
  }

  test("fig1: u2 admits exactly the A-vertices with matching structure") {
    val c = IHSFilter.candidates(qIdx, dIdx)
    // u2 (A, in a 2-edge and a 3-edge) → v2 and v7 have that shape
    assert(c(2).toSeq == Seq(2, 7))
  }

  test("fig1: u4 (B, in 2-edge and 4-edge) admits v4 and v9") {
    val c = IHSFilter.candidates(qIdx, dIdx)
    assert(c(4).toSeq == Seq(4, 9))
  }

  test("fig1: u3 (A, only in the 4-edge) admits the 4-edge A-vertices") {
    val c = IHSFilter.candidates(qIdx, dIdx)
    // v0,v3 in e5 and v5,v8 in e6 are A-vertices of 4-edges; v0,v5 also sit
    // in 3-edges (superset is fine for containment conditions)
    assert(c(3).toSeq == Seq(0, 3, 5, 8))
  }

  test("degree condition: d(u) <= d(v)") {
    // query vertex with degree 2 cannot map to data vertex of degree 1
    val c = IHSFilter.candidates(qIdx, dIdx)
    // u0 has degree 2 (e_q1, e_q2); v3 has degree 1 → not a candidate
    assert(!c(0).contains(3))
  }

  test("arity containment: |he^a(u)| <= |he^a(v)| for every a") {
    // u0 needs a 3-edge and a 4-edge; v0 has exactly that
    val c = IHSFilter.candidates(qIdx, dIdx)
    assert(c(0).toSeq == Seq(0, 5))
  }

  test("signature condition rejects same-arity different-label hyperedges") {
    val query = Hypergraph(Seq(0, 0), Seq(Seq(0, 1)))          // sig {A,A}
    val data = Hypergraph(Seq(0, 1), Seq(Seq(0, 1)))           // sig {A,B}
    val c = IHSFilter.candidates(new IHSIndex(query), new IHSIndex(data))
    assert(c(0).isEmpty && c(1).isEmpty)
  }

  test("every true embedding's vertices survive the filter (soundness)") {
    for (seed <- 1 to 10) {
      val data = TestGraphs.random(18, 24, 2, 4, seed)
      TestGraphs.sampleQuery(data, 3, seed * 7).foreach { query =>
        val c = IHSFilter.candidates(new IHSIndex(query), new IHSIndex(data))
        // The sampled query IS a sub-hypergraph: the identity-ish mapping
        // exists, so no candidate set may be empty.
        (0 until query.numVertices).foreach(u => assert(c(u).nonEmpty, s"seed=$seed u=$u"))
      }
    }
  }

  test("candidate sets are sorted") {
    val c = IHSFilter.candidates(qIdx, dIdx)
    c.foreach(arr => assert(arr.toSeq == arr.toSeq.sorted))
  }
}
