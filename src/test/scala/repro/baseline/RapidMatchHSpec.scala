package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.core._
import repro.engine.SequentialEngine

class RapidMatchHSpec extends AnyFunSuite {

  private val h = Hypergraph.fig1Data
  private val q = Hypergraph.fig1Query

  test("fig1: two mappings, two tuples via bipartite conversion") {
    val r = RapidMatchH.run(q, h, collectTuples = true)
    assert(r.completed)
    assert(r.vertexMappings == 2)
    assert(r.edgeTuples == 2)
  }

  test("mapping counts equal MatchByVertex's (same semantics)") {
    for (seed <- 1 to 12) {
      val data = TestGraphs.random(14, 18, 2, 3, seed)
      val idx = new IHSIndex(data)
      TestGraphs.sampleQuery(data, 2, seed * 3).foreach { query =>
        val bt = Baselines.run(Baselines.DAFH, query, data, idx, collectTuples = true)
        val rm = RapidMatchH.run(query, data, collectTuples = true)
        assert(rm.vertexMappings == bt.vertexMappings, s"seed=$seed")
        assert(rm.edgeTuples == bt.edgeTuples, s"seed=$seed")
      }
    }
  }

  test("edge tuples agree with HGMatch on random workloads") {
    for (seed <- 1 to 12) {
      val data = TestGraphs.random(16, 20, 2, 4, seed)
      val tb = HyperedgeTables.build(data)
      TestGraphs.sampleQuery(data, 3, seed * 7).foreach { query =>
        val hg = SequentialEngine.run(tb, Plan.generate(query, tb)).embeddings
        val rm = RapidMatchH.run(query, data, collectTuples = true)
        assert(rm.edgeTuples == hg, s"seed=$seed hg=$hg rm=${rm.edgeTuples}")
      }
    }
  }

  test("signature labels prevent hyperedge containment false matches") {
    // Query edge {A,A}; data edge {A,A,A}: subset incidence must NOT match.
    val query = Hypergraph(Seq(0, 0), Seq(Seq(0, 1)))
    val data = Hypergraph(Seq(0, 0, 0), Seq(Seq(0, 1, 2)))
    val r = RapidMatchH.run(query, data, collectTuples = true)
    assert(r.vertexMappings == 0)
  }

  test("timeout reports incomplete") {
    val data = TestGraphs.random(40, 200, 1, 3, 21)
    TestGraphs.sampleQuery(data, 4, 22).foreach { query =>
      val r = RapidMatchH.run(query, data, timeoutNanos = 1L)
      assert(!r.completed)
    }
  }
}
