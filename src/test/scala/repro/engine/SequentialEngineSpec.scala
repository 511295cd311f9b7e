package repro.engine

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.core._

class SequentialEngineSpec extends AnyFunSuite {

  private val h = Hypergraph.fig1Data
  private val t = HyperedgeTables.build(h)
  private val q = Hypergraph.fig1Query

  test("fig1: exactly two embeddings (e1,e3,e5) and (e2,e4,e6)") {
    val sink = new CollectingSink
    val r = SequentialEngine.run(t, Plan.fromOrder(q, Array(0, 1, 2)), sink)
    assert(r.completed)
    assert(r.embeddings == 2)
    assert(sink.results.toSet == Set(Vector(0, 2, 4), Vector(1, 3, 5)))
  }

  test("fig1: any matching order finds the same two embeddings") {
    for (order <- Seq(Array(0, 1, 2), Array(1, 0, 2), Array(2, 1, 0), Array(1, 2, 0), Array(2, 0, 1))) {
      val r = SequentialEngine.run(t, Plan.fromOrder(q, order))
      assert(r.embeddings == 2, s"order ${order.toSeq}")
    }
  }

  test("single-hyperedge query: embeddings = partition size") {
    val query = Hypergraph(Seq(0, 1), Seq(Seq(0, 1))) // sig {A,B}
    val r = SequentialEngine.run(t, Plan.generate(query, t))
    assert(r.embeddings == 2) // e1, e2
  }

  test("query with unmatchable signature yields zero") {
    val query = Hypergraph(Seq(1, 1), Seq(Seq(0, 1))) // sig {B,B} absent
    val r = SequentialEngine.run(t, Plan.generate(query, t))
    assert(r.embeddings == 0)
  }

  test("counters: candidates >= filtered >= validated") {
    val r = SequentialEngine.run(t, Plan.fromOrder(q, Array(0, 1, 2)))
    val (c, f, v) = r.counters
    assert(c >= f && f >= v)
    assert(v == 2 + 2) // two valid extensions at each of two steps
  }

  test("timeout marks the run incomplete") {
    val data = TestGraphs.random(60, 300, 1, 3, 9)
    val tb = HyperedgeTables.build(data)
    TestGraphs.sampleQuery(data, 4, 17).foreach { query =>
      val r = SequentialEngine.run(tb, Plan.generate(query, tb), timeoutNanos = 1L)
      assert(!r.completed)
    }
  }

  test("sequential engine agrees with the DuckDB-checkable tuple semantics") {
    // Query with an automorphism: two label-identical disjoint edges in q,
    // each mapping to either of two data edges → 2 ordered tuples.
    val data = Hypergraph(Seq(0, 0, 0, 0, 0), Seq(Seq(0, 1), Seq(1, 2), Seq(2, 3)))
    val tb = HyperedgeTables.build(data)
    val query = QueryFixtures.chain3
    val r = SequentialEngine.run(tb, Plan.generate(query, tb))
    // chain of 3 in a path of 3 edges: forward and backward.
    assert(r.embeddings == 2)
  }

  test("embedding arrays follow the matching order positions") {
    val sink = new CollectingSink
    val plan = Plan.fromOrder(q, Array(2, 1, 0))
    SequentialEngine.run(t, plan, sink)
    sink.results.foreach { tup =>
      // position 0 holds a hyperedge with e_q2's signature {A,A,B,C}
      assert(h.signature(tup(0)) == q.signature(2))
      assert(h.signature(tup(2)) == q.signature(0))
    }
  }

  test("stress: random graphs never crash and counts are non-negative") {
    for (seed <- 1 to 25) {
      val data = TestGraphs.random(18, 22, 2, 4, seed)
      val tb = HyperedgeTables.build(data)
      TestGraphs.sampleQuery(data, 3, seed).foreach { query =>
        val r = SequentialEngine.run(tb, Plan.generate(query, tb))
        assert(r.completed && r.embeddings >= 1) // sampled from data ⇒ ≥ 1
      }
    }
  }
}
