package repro.data

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.TestGraphs
import repro.core.{HyperedgeTables, Plan}
import repro.engine.SequentialEngine

class QuerySamplerSpec extends AnyFunSuite {

  private val data = TestGraphs.random(60, 120, 3, 6, 5)

  test("Table III settings are the paper's") {
    assert(QuerySetting.q2 == QuerySetting("q2", 2, 5, 15))
    assert(QuerySetting.q3 == QuerySetting("q3", 3, 10, 20))
    assert(QuerySetting.q4 == QuerySetting("q4", 4, 10, 30))
    assert(QuerySetting.q6 == QuerySetting("q6", 6, 15, 35))
  }

  test("sampled query has the requested number of hyperedges") {
    val qs = QuerySampler.sample(data, QuerySetting("t", 3, 0, 100), 10, seed = 1)
    qs.foreach(q => assert(q.numEdges == 3))
    assert(qs.size == 10)
  }

  test("sampled query is connected") {
    val qs = QuerySampler.sample(data, QuerySetting("t", 4, 0, 100), 10, seed = 2)
    qs.foreach(q => assert(q.isConnected))
  }

  test("vertex bounds are enforced when reachable") {
    val rnd = new Random(3)
    (1 to 30).foreach { _ =>
      QuerySampler.sampleOnce(data, QuerySetting("t", 3, 6, 12), rnd).foreach { q =>
        assert(q.numVertices >= 6 && q.numVertices <= 12)
      }
    }
  }

  test("sampled query labels live in the data label space") {
    val qs = QuerySampler.sample(data, QuerySetting("t", 3, 0, 100), 5, seed = 4)
    val dataLabels = data.labels.toSet
    qs.foreach(q => q.labels.foreach(l => assert(dataLabels.contains(l))))
  }

  test("sampled query has at least one embedding in the data (paper guarantee)") {
    val qs = QuerySampler.sample(data, QuerySetting("t", 3, 0, 100), 8, seed = 5)
    val tb = HyperedgeTables.build(data)
    qs.foreach { q =>
      val r = SequentialEngine.run(tb, Plan.generate(q, tb))
      assert(r.embeddings >= 1)
    }
  }

  test("induced subhypergraph preserves edge structure") {
    val q = QuerySampler.induced(data, Seq(0, 1))
    assert(q.numEdges <= 2) // dedup may collapse
    assert(q.numVertices <= data.edges(0).length + data.edges(1).length)
  }

  test("sampling is deterministic in the seed") {
    val a = QuerySampler.sample(data, QuerySetting("t", 3, 0, 100), 5, seed = 9)
    val b = QuerySampler.sample(data, QuerySetting("t", 3, 0, 100), 5, seed = 9)
    assert(a.map(_.toString) == b.map(_.toString))
    assert(a.zip(b).forall { case (x, y) =>
      x.edges.map(_.toSeq).toSeq == y.edges.map(_.toSeq).toSeq
    })
  }

  test("relaxation kicks in when strict bounds are unreachable") {
    // demand |V| >= 50 from 2 low-arity edges — impossible strictly
    val lowArity = TestGraphs.random(40, 60, 2, 3, 6)
    val qs = QuerySampler.sample(lowArity, QuerySetting("t", 2, 50, 60), 3, seed = 7, strictTries = 30)
    assert(qs.nonEmpty) // relaxed samples still delivered
    qs.foreach(q => assert(q.numEdges == 2))
  }

  test("asking more edges than the data has yields nothing") {
    val tiny = TestGraphs.random(6, 2, 1, 3, 8)
    val qs = QuerySampler.sample(tiny, QuerySetting("t", 10, 0, 100), 2, seed = 8, strictTries = 5)
    assert(qs.isEmpty)
  }

  test("sampleHeavy only uses edges from frequent signature partitions") {
    val tables = HyperedgeTables.build(data)
    val minCard = 5
    val qs = QuerySampler.sampleHeavy(data, tables, 2, 5, seed = 11, minCard = minCard)
    qs.foreach { q =>
      (0 until q.numEdges).foreach { e =>
        assert(tables.cardinality(q.signature(e)) >= minCard)
      }
    }
  }

  test("sampleChains produces chains: consecutive overlap 1, others 0") {
    val tables = HyperedgeTables.build(data)
    val qs = QuerySampler.sampleChains(data, tables, 3, 5, seed = 12, minCard = 2)
    qs.foreach { q =>
      assert(q.numEdges == 3)
      val sets = q.edges.map(_.toSet)
      assert((sets(0) & sets(1)).size == 1)
      assert((sets(1) & sets(2)).size == 1)
      assert((sets(0) & sets(2)).isEmpty)
    }
  }

  test("sampleChains queries have at least one embedding") {
    val tables = HyperedgeTables.build(data)
    val qs = QuerySampler.sampleChains(data, tables, 3, 3, seed = 13, minCard = 2)
    qs.foreach { q =>
      val r = SequentialEngine.run(tables, Plan.generate(q, tables))
      assert(r.embeddings >= 1)
    }
  }

  test("sampleChains is deterministic in the seed") {
    val tables = HyperedgeTables.build(data)
    val a = QuerySampler.sampleChains(data, tables, 3, 4, seed = 14, minCard = 2)
    val b = QuerySampler.sampleChains(data, tables, 3, 4, seed = 14, minCard = 2)
    assert(a.size == b.size)
    a.zip(b).foreach { case (x, y) =>
      assert(x.edges.map(_.toSeq).toSeq == y.edges.map(_.toSeq).toSeq)
    }
  }
}
