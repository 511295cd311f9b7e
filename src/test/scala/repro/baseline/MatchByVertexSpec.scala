package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.core._
import repro.engine.SequentialEngine

class MatchByVertexSpec extends AnyFunSuite {

  private val h = Hypergraph.fig1Data
  private val q = Hypergraph.fig1Query
  private val dIdx = new IHSIndex(h)

  test("fig1: two vertex mappings and two edge tuples") {
    for (algo <- Seq(Baselines.CFLH, Baselines.DAFH, Baselines.CECIH)) {
      val r = Baselines.run(algo, q, h, dIdx, collectTuples = true)
      assert(r.completed)
      assert(r.vertexMappings == 2, algo.name)
      assert(r.edgeTuples == 2, algo.name)
    }
  }

  test("vertex mappings can exceed edge tuples under query symmetry") {
    // Query: single edge {A,A}; data: single edge {A,A} → 2 mappings, 1 tuple.
    val query = Hypergraph(Seq(0, 0), Seq(Seq(0, 1)))
    val data = Hypergraph(Seq(0, 0), Seq(Seq(0, 1)))
    val r = MatchByVertex.run(query, data, Array(0, 1),
      IHSFilter.candidates(new IHSIndex(query), new IHSIndex(data)), collectTuples = true)
    assert(r.vertexMappings == 2)
    assert(r.edgeTuples == 1)
  }

  test("hyperedge constraint (Thm III.2) rejects pairwise-only matches") {
    // Query edge {0,1,2}; data has all three pairwise edges but no triangle
    // hyperedge — match-by-vertex must find nothing.
    val query = Hypergraph(Seq(0, 0, 0), Seq(Seq(0, 1, 2)))
    val data = Hypergraph(Seq(0, 0, 0), Seq(Seq(0, 1), Seq(1, 2), Seq(0, 2)))
    val r = MatchByVertex.run(query, data, Array(0, 1, 2),
      IHSFilter.candidates(new IHSIndex(query), new IHSIndex(data)), collectTuples = true)
    assert(r.vertexMappings == 0)
  }

  test("edge tuples agree with HGMatch on random workloads (all baselines)") {
    for (seed <- 1 to 15) {
      val data = TestGraphs.random(16, 20, 2, 4, seed)
      val tb = HyperedgeTables.build(data)
      val idx = new IHSIndex(data)
      TestGraphs.sampleQuery(data, 3, seed * 5).foreach { query =>
        val hg = SequentialEngine.run(tb, Plan.generate(query, tb)).embeddings
        for (algo <- Seq(Baselines.CFLH, Baselines.DAFH, Baselines.CECIH)) {
          val r = Baselines.run(algo, query, data, idx, collectTuples = true)
          assert(r.edgeTuples == hg, s"seed=$seed algo=${algo.name} hg=$hg bt=${r.edgeTuples}")
        }
      }
    }
  }

  test("timeout reports incomplete") {
    val data = TestGraphs.random(40, 200, 1, 3, 3)
    val idx = new IHSIndex(data)
    TestGraphs.sampleQuery(data, 4, 31).foreach { query =>
      val r = Baselines.run(Baselines.CFLH, query, data, idx, timeoutNanos = 1L)
      assert(!r.completed)
    }
  }

  test("order must be a permutation") {
    assertThrows[IllegalArgumentException] {
      MatchByVertex.run(q, h, Array(0, 0, 2, 3, 4),
        IHSFilter.candidates(new IHSIndex(q), dIdx))
    }
  }

  test("injectivity: a data vertex is never used twice") {
    // Query path A-A-A; data triangle A-A-A: tuples exist, but a mapping
    // can never fold two query vertices onto one data vertex.
    val query = Hypergraph(Seq(0, 0, 0), Seq(Seq(0, 1), Seq(1, 2)))
    val data = Hypergraph(Seq(0, 0), Seq(Seq(0, 1)))
    val r = MatchByVertex.run(query, data, Array(0, 1, 2),
      IHSFilter.candidates(new IHSIndex(query), new IHSIndex(data)), collectTuples = true)
    assert(r.vertexMappings == 0)
  }
}
