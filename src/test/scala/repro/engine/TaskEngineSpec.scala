package repro.engine

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.core._

class TaskEngineSpec extends AnyFunSuite {

  private val h = Hypergraph.fig1Data
  private val t = HyperedgeTables.build(h)
  private val q = Hypergraph.fig1Query
  private val plan = Plan.fromOrder(q, Array(0, 1, 2))

  test("fig1 with 1 thread") {
    val r = TaskEngine.run(t, plan, TaskEngineConfig(1))
    assert(r.outcome.completed && r.outcome.embeddings == 2)
  }

  test("fig1 with several thread counts") {
    for (p <- Seq(2, 3, 4, 8)) {
      val r = TaskEngine.run(t, plan, TaskEngineConfig(p))
      assert(r.outcome.embeddings == 2, s"p=$p")
    }
  }

  test("collecting sink sees the exact tuples under parallelism") {
    val sink = new CollectingSink
    TaskEngine.run(t, plan, TaskEngineConfig(4), sink)
    assert(sink.results.toSet == Set(Vector(0, 2, 4), Vector(1, 3, 5)))
  }

  test("stealing off still computes the full result") {
    for (p <- Seq(1, 2, 4)) {
      val r = TaskEngine.run(t, plan, TaskEngineConfig(p, stealing = false))
      assert(r.outcome.embeddings == 2, s"p=$p nostl")
    }
  }

  test("agrees with sequential engine on random workloads, all thread counts") {
    for (seed <- 1 to 12) {
      val data = TestGraphs.random(20, 30, 2, 4, seed)
      val tb = HyperedgeTables.build(data)
      TestGraphs.sampleQuery(data, 3, seed * 3).foreach { query =>
        val p = Plan.generate(query, tb)
        val expected = SequentialEngine.run(tb, p).embeddings
        for (threads <- Seq(1, 2, 4, 7); stealing <- Seq(true, false)) {
          val r = TaskEngine.run(tb, p, TaskEngineConfig(threads, stealing))
          assert(r.outcome.embeddings == expected,
            s"seed=$seed threads=$threads stealing=$stealing")
        }
      }
    }
  }

  test("per-worker stats account for all executed tasks") {
    val r = TaskEngine.run(t, plan, TaskEngineConfig(3))
    // tasks = scan seeds (2) + expansions spawned (2 at step1) + sinks (2)
    assert(r.workers.map(_.tasks).sum == 6)
  }

  test("peak queue bytes within the Theorem VI.1 bound") {
    for (seed <- 1 to 8) {
      val data = TestGraphs.random(25, 40, 2, 4, seed)
      val tb = HyperedgeTables.build(data)
      TestGraphs.sampleQuery(data, 3, seed * 5).foreach { query =>
        val p = Plan.generate(query, tb)
        val r = TaskEngine.run(tb, p, TaskEngineConfig(4))
        // Bound: O(ā_q · |E(q)|² · |E(H)|) task bytes (+ constant task
        // headers); use a generous constant factor of 64.
        val bound = 64L * (query.avgArity.ceil.toLong max 1) *
          query.numEdges * query.numEdges * data.numEdges
        assert(r.peakQueueBytes <= bound,
          s"seed=$seed peak=${r.peakQueueBytes} bound=$bound")
      }
    }
  }

  test("work stealing happens on skewed seeds (smoke)") {
    // Single scan seed with many expansions: without stealing only one
    // worker is busy; with stealing others pick up tasks.
    val data = TestGraphs.random(30, 120, 1, 3, 42)
    val tb = HyperedgeTables.build(data)
    TestGraphs.sampleQuery(data, 3, 7).foreach { query =>
      val p = Plan.generate(query, tb)
      val r = TaskEngine.run(tb, p, TaskEngineConfig(4))
      val seq = SequentialEngine.run(tb, p)
      assert(r.outcome.embeddings == seq.embeddings)
      // at least the result is right; steal counters are observable
      assert(r.workers.map(_.steals).sum >= 0)
    }
  }

  test("timeout aborts and reports incomplete") {
    val data = TestGraphs.random(60, 400, 1, 3, 11)
    val tb = HyperedgeTables.build(data)
    TestGraphs.sampleQuery(data, 4, 23).foreach { query =>
      val p = Plan.generate(query, tb)
      val r = TaskEngine.run(tb, p, TaskEngineConfig(4), timeoutNanos = 1L)
      assert(!r.outcome.completed)
    }
  }

  test("rejects zero threads") {
    assertThrows[IllegalArgumentException] {
      TaskEngine.run(t, plan, TaskEngineConfig(0))
    }
  }

  test("more workers than scan seeds still completes") {
    // partition {A,B} has 2 seeds; 8 workers → 6 start idle and must steal
    // or exit cleanly.
    val r = TaskEngine.run(t, plan, TaskEngineConfig(8))
    assert(r.outcome.embeddings == 2)
  }

  test("empty scan partition terminates immediately") {
    val query = Hypergraph(Seq(1, 1), Seq(Seq(0, 1))) // sig {B,B} absent
    val r = TaskEngine.run(t, Plan.generate(query, t), TaskEngineConfig(4))
    assert(r.outcome.completed && r.outcome.embeddings == 0)
  }

  test("single-edge query sinks straight from scan") {
    val query = Hypergraph(Seq(0, 1), Seq(Seq(0, 1)))
    val r = TaskEngine.run(t, Plan.generate(query, t), TaskEngineConfig(3))
    assert(r.outcome.embeddings == 2)
  }

  test("contiguous share seeding covers every seed exactly once") {
    // With stealing off and 3 workers, the 2 seeds go to distinct shares
    // and both embeddings are still found.
    val r = TaskEngine.run(t, plan, TaskEngineConfig(3, stealing = false))
    assert(r.outcome.embeddings == 2)
    assert(r.workers.map(_.tasks).sum == 6)
  }

  test("deterministic counts across repeated parallel runs") {
    val data = TestGraphs.random(25, 60, 2, 4, 77)
    val tb = HyperedgeTables.build(data)
    TestGraphs.sampleQuery(data, 3, 99).foreach { query =>
      val p = Plan.generate(query, tb)
      val counts = (1 to 5).map(_ => TaskEngine.run(tb, p, TaskEngineConfig(6)).outcome.embeddings)
      assert(counts.distinct.size == 1)
    }
  }
}
