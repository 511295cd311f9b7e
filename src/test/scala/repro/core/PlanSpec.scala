package repro.core

import org.scalatest.funsuite.AnyFunSuite

class PlanSpec extends AnyFunSuite {

  private val h = Hypergraph.fig1Data
  private val t = HyperedgeTables.build(h)
  private val q = Hypergraph.fig1Query

  // Fix the paper's order φ = (e_q0 {u2,u4}, e_q1 {u0,u1,u2}, e_q2 {u0,u1,u3,u4}).
  private val plan = Plan.fromOrder(q, Array(0, 1, 2))

  test("plan has one step per non-scan hyperedge") {
    assert(plan.steps.length == 2)
    assert(plan.scanSignature == Signature.of(Seq(0, 1)))
  }

  test("step 1 pairs: e_q1 shares u2 with e_q0") {
    val s = plan.steps(0)
    assert(s.queryEdge == 1)
    // u2 has label A(0) and degree 1 in the partial query {e_q0}
    assert(s.pairs.toSeq == Seq(PairSpec(prevPos = 0, label = 0, degInPartial = 1)))
    assert(s.nonAdjPrevPos.isEmpty)
  }

  test("step 2 pairs: e_q2 shares u0,u1 with e_q1 and u4 with e_q0") {
    val s = plan.steps(1)
    assert(s.queryEdge == 2)
    val expected = Set(
      PairSpec(0, 1, 1), // u4: label B, in e_q0 only
      PairSpec(1, 0, 1), // u0: label A, in e_q1 only
      PairSpec(1, 2, 1), // u1: label C, in e_q1 only
    )
    assert(s.pairs.toSet == expected)
    assert(s.nonAdjPrevPos.isEmpty)
  }

  test("expected vertex counts accumulate |V(q')|") {
    assert(plan.steps(0).expectedVertexCount == 4) // u0,u1,u2,u4
    assert(plan.steps(1).expectedVertexCount == 5)
  }

  test("expected profiles of step 1 (vertices of e_q1 over positions 0..1)") {
    val s = plan.steps(0)
    // u0:(A,{1}) u1:(C,{1}) u2:(A,{0,1})
    assert(s.expectedProfiles == Profile.canon(Seq(
      Profile(0, Vector(1)), Profile(2, Vector(1)), Profile(0, Vector(0, 1)))))
  }

  test("expected profiles of step 2") {
    val s = plan.steps(1)
    // u0:(A,{1,2}) u1:(C,{1,2}) u3:(A,{2}) u4:(B,{0,2})
    assert(s.expectedProfiles == Profile.canon(Seq(
      Profile(0, Vector(1, 2)), Profile(2, Vector(1, 2)),
      Profile(0, Vector(2)), Profile(1, Vector(0, 2)))))
  }

  test("non-adjacent previous edges are recorded") {
    // Query: e0 {0,1}, e1 {1,2}, e2 {2,3} — e2 is non-adjacent to e0.
    val query = QueryFixtures.chain3
    val p = Plan.fromOrder(query, Array(0, 1, 2))
    assert(p.steps(1).nonAdjPrevPos.toSeq == Seq(0))
  }

  test("degInPartial counts only earlier edges") {
    // u1 sits in e0 and e1; when matching e2 = {1,3} after (e0, e1) its
    // partial degree is 2.
    val query = Hypergraph(Seq(0, 0, 0, 0), Seq(Seq(0, 1), Seq(1, 2), Seq(1, 3)))
    val p = Plan.fromOrder(query, Array(0, 1, 2))
    val pairsForU1 = p.steps(1).pairs.filter(_.degInPartial == 2)
    assert(pairsForU1.nonEmpty) // u1 contributes pairs from both prior edges
    assert(p.steps(1).pairs.toSet ==
      Set(PairSpec(0, 0, 2), PairSpec(1, 0, 2))) // u1 via e0 and via e1
  }

  test("fromOrder rejects non-permutations") {
    assertThrows[IllegalArgumentException] {
      Plan.fromOrder(q, Array(0, 0, 2))
    }
  }

  test("generate uses the matching order") {
    val p = Plan.generate(q, t)
    assert(p.order.toSeq == MatchingOrder.compute(q, t).toSeq)
  }

  test("profile ordering is total and canonical") {
    val a = Seq(Profile(1, Vector(0)), Profile(0, Vector(1)), Profile(0, Vector(0, 1)))
    assert(Profile.canon(a) == Profile.canon(a.reverse))
  }
}
