package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{HyperedgeTables, Plan}
import repro.engine.{CollectingSink, SequentialEngine}

class KnowledgeBaseSpec extends AnyFunSuite {

  private val kb = KnowledgeBase.generate(nPlayers = 40, multiTeam = 7, nActors = 30, recastPairs = 5)
  private val tables = HyperedgeTables.build(kb.graph)

  test("KB facts have the two signature shapes") {
    val sigs = (0 until kb.graph.numEdges).map(kb.graph.signature).toSet
    assert(sigs.exists(_.arity == 3)) // (Player, Team, Match)
    assert(sigs.exists(_.arity == 4)) // (Actor, Character, TVShow, Season)
  }

  test("Query 1 finds exactly the planted multi-team players (x2 symmetry)") {
    val r = SequentialEngine.run(tables, Plan.generate(KnowledgeBase.query1, tables))
    assert(r.embeddings == 2L * kb.plantedQuery1)
  }

  test("Query 2 finds exactly the planted recast pairs (x2 symmetry)") {
    val r = SequentialEngine.run(tables, Plan.generate(KnowledgeBase.query2, tables))
    assert(r.embeddings == 2L * kb.plantedQuery2)
  }

  test("same-team repeat facts are not Query 1 answers") {
    // generate with no multi-team players: zero answers even though some
    // players have two facts (same team).
    val kb0 = KnowledgeBase.generate(nPlayers = 40, multiTeam = 0, nActors = 5, recastPairs = 0, seed = 11L)
    val t0 = HyperedgeTables.build(kb0.graph)
    val r = SequentialEngine.run(t0, Plan.generate(KnowledgeBase.query1, t0))
    assert(r.embeddings == 0)
  }

  test("query answers reference valid fact pairs") {
    val sink = new CollectingSink
    val plan = Plan.generate(KnowledgeBase.query1, tables)
    SequentialEngine.run(tables, plan, sink)
    sink.results.foreach { tup =>
      assert(tup.length == 2)
      val Seq(e1, e2) = tup.map(kb.graph.edges(_)).toSeq
      // the two facts share exactly one vertex: the player
      val shared = e1.toSet & e2.toSet
      assert(shared.size == 1)
      assert(kb.graph.labels(shared.head) == KnowledgeBase.Player)
    }
  }

  test("baseline agrees on the case-study queries") {
    import repro.baseline._
    val idx = new IHSIndex(kb.graph)
    val r1 = Baselines.run(Baselines.DAFH, KnowledgeBase.query1, kb.graph, idx, collectTuples = true)
    assert(r1.edgeTuples == 2L * kb.plantedQuery1)
    val r2 = Baselines.run(Baselines.CECIH, KnowledgeBase.query2, kb.graph, idx, collectTuples = true)
    assert(r2.edgeTuples == 2L * kb.plantedQuery2)
  }

  test("generation is deterministic") {
    val a = KnowledgeBase.generate(seed = 3L)
    val b = KnowledgeBase.generate(seed = 3L)
    assert(a.graph.numEdges == b.graph.numEdges)
    assert(a.graph.labels.sameElements(b.graph.labels))
  }
}
