package repro.core

import org.scalatest.funsuite.AnyFunSuite

class ValidationSpec extends AnyFunSuite {

  private val h = Hypergraph.fig1Data
  private val t = HyperedgeTables.build(h)
  private val q = Hypergraph.fig1Query
  private val plan = Plan.fromOrder(q, Array(0, 1, 2))

  test("fig1: extending (e1) with e3 is valid") {
    assert(Validation.isValid(t, plan.steps(0), Array(0), 2))
  }

  test("fig1: extending (e1) with e4 is invalid (no shared vertex)") {
    assert(!Validation.isValid(t, plan.steps(0), Array(0), 3))
  }

  test("fig1: extending (e1,e3) with e5 completes a valid embedding") {
    assert(Validation.isValid(t, plan.steps(1), Array(0, 2), 4))
  }

  test("fig1: extending (e1,e3) with e6 is invalid") {
    assert(!Validation.isValid(t, plan.steps(1), Array(0, 2), 5))
  }

  test("vertex-count check (Obs V.5) rejects over-overlapping candidates") {
    // Query: two disjoint-except-u1 edges; data edges overlap on 2 verts.
    val query = Hypergraph(Seq(0, 0, 0), Seq(Seq(0, 1), Seq(1, 2)))
    val data = Hypergraph(Seq(0, 0), Seq(Seq(0, 1))) // single edge reused is rejected
    val tb = HyperedgeTables.build(data)
    val p = Plan.fromOrder(query, Array(0, 1))
    assert(!Validation.isValid(tb, p.steps(0), Array(0), 0)) // duplicate edge
  }

  test("duplicate data hyperedge always rejected, fast path or not") {
    val query = Hypergraph(Seq(0, 0, 0), Seq(Seq(0, 1), Seq(1, 2)))
    val data = Hypergraph(Seq(0, 0, 0), Seq(Seq(0, 1), Seq(1, 2)))
    val tb = HyperedgeTables.build(data)
    val p = Plan.fromOrder(query, Array(0, 1))
    assert(Validation.isValid(tb, p.steps(0), Array(0), 1))
    assert(!Validation.isValid(tb, p.steps(0), Array(0), 0))
  }

  test("profile check rejects wrong overlap pattern despite right count") {
    // Query: path e0{0,1}, e1{1,2} — overlap on ONE vertex, 3 vertices.
    // Data: d0{0,1}, d1{2,3} disjoint — candidate d1 gives 4 vertices → V.5
    // rejects; d2{0,2} overlaps on the WRONG end vertex... with labels all
    // equal both overlaps look alike by count; distinguish by labels:
    val query = Hypergraph(Seq(0, 1, 0), Seq(Seq(0, 1), Seq(1, 2)))
    // data: d0 = {A,B} {0,1}; d1 = {B,C?}.. need sig {A,B} for e1 too:
    // e1 = {u1(B), u2(A)} sig {A,B}. Data candidate d1 = {2,3} labels A,B
    // overlapping d0 at nothing → count fails; d2 = {1,2} labels B,A
    // overlapping at v1 (B) → valid.
    val data = Hypergraph(Seq(0, 1, 0, 1), Seq(Seq(0, 1), Seq(2, 3), Seq(1, 2)))
    val tb = HyperedgeTables.build(data)
    val p = Plan.fromOrder(query, Array(0, 1))
    assert(!Validation.isValid(tb, p.steps(0), Array(0), 1)) // disjoint
    assert(Validation.isValid(tb, p.steps(0), Array(0), 2))  // overlap at B
  }

  test("profile check distinguishes which endpoint overlaps") {
    // Query path A-B then B-A sharing the B vertex. A data pair sharing the
    // A vertex has the right total count but wrong profiles.
    val query = Hypergraph(Seq(0, 1, 0), Seq(Seq(0, 1), Seq(1, 2)))
    val data = Hypergraph(Seq(0, 1, 1), Seq(Seq(0, 1), Seq(0, 2)))
    // d1 = {0,2} labels {A,B} — shares the A vertex with d0 instead of B.
    val tb = HyperedgeTables.build(data)
    val p = Plan.fromOrder(query, Array(0, 1))
    assert(!Validation.isValid(tb, p.steps(0), Array(0), 1))
  }

  test("vertexCountOk and profilesOk are independently callable") {
    assert(Validation.vertexCountOk(t, plan.steps(0), Array(0), 2))
    assert(Validation.profilesOk(t, plan.steps(0), Array(0), 2))
    assert(!Validation.profilesOk(t, plan.steps(0), Array(0), 3))
  }

  test("packed-key fast path agrees with the reference Algorithm 5") {
    import repro.TestGraphs
    for (seed <- 1 to 20) {
      val data = TestGraphs.random(18, 24, 2, 4, seed)
      val tb = HyperedgeTables.build(data)
      TestGraphs.sampleQuery(data, 3, seed * 3).foreach { query =>
        val p = Plan.generate(query, tb)
        // walk valid prefixes and compare both validation paths on every
        // candidate of every step
        var frontier = tb.edgesOf(p.scanSignature).map(e => Array(e)).toSeq
        p.steps.foreach { step =>
          val next = scala.collection.mutable.ArrayBuffer.empty[Array[Int]]
          frontier.foreach { emb =>
            val keys = new Array[Long](step.signature.arity)
            CandidateGen.candidates(tb, step, emb).foreach { c =>
              val slow = Validation.isValid(tb, step, emb, c)
              val dup = emb.contains(c)
              val fresh = Validation.profileKeys(tb, step, emb, c, keys)
              val fast = !dup && Validation.freshCountOk(step, fresh) &&
                Validation.profileKeysOk(step, keys, step.signature.arity)
              assert(slow == fast, s"seed=$seed emb=${emb.toSeq} c=$c")
              if (slow) next += (emb :+ c)
            }
          }
          frontier = next.toSeq
        }
      }
    }
  }

  test("plan exposes consistent newVertexCount and packed keys") {
    assert(plan.steps(0).newVertexCount == 2) // u0, u1 join at step 1
    assert(plan.steps(1).newVertexCount == 1) // u3 joins at step 2
    plan.steps.foreach { s =>
      assert(s.expectedProfileKeys.length == s.expectedProfiles.length)
      assert(s.expectedProfileKeys.toSeq == s.expectedProfileKeys.toSeq.sorted)
      assert(s.expectedProfileKeys.toSet ==
        s.expectedProfiles.map(p => Profiles.key(p.label, p.positions)).toSet)
    }
  }

  test("Example V.2 style: same counts, mismatched profile multisets") {
    // Query: e0{u0,u1}, e1{u1,u2}, e2{u0,u1,u2} (all label A).
    // Data:  d0{0,1},  d1{1,2},  d2{0,1,2} — valid triangle-ish.
    //        d3{0,2,3} — arity 3, but overlaps e-structure differently.
    val query = Hypergraph(Seq(0, 0, 0), Seq(Seq(0, 1), Seq(1, 2), Seq(0, 1, 2)))
    val data = Hypergraph(Seq(0, 0, 0, 0),
      Seq(Seq(0, 1), Seq(1, 2), Seq(0, 1, 2), Seq(0, 2, 3)))
    val tb = HyperedgeTables.build(data)
    val p = Plan.fromOrder(query, Array(0, 1, 2))
    assert(Validation.isValid(tb, p.steps(1), Array(0, 1), 2))
    assert(!Validation.isValid(tb, p.steps(1), Array(0, 1), 3))
  }
}
