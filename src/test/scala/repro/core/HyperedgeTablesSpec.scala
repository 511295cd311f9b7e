package repro.core

import org.scalatest.funsuite.AnyFunSuite

class HyperedgeTablesSpec extends AnyFunSuite {

  private val h = Hypergraph.fig1Data
  private val t = HyperedgeTables.build(h)

  private val sigAB = Signature.of(Seq(0, 1))
  private val sigAAC = Signature.of(Seq(0, 0, 2))
  private val sigAABC = Signature.of(Seq(0, 0, 1, 2))

  test("Table I: three partitions with the paper's signatures") {
    assert(t.partitions.keySet == Set(sigAB, sigAAC, sigAABC))
  }

  test("Table I: partition {A,B} holds e1,e2 (ids 0,1)") {
    assert(t.edgesOf(sigAB).toSeq == Seq(0, 1))
  }

  test("Table I: partition {A,A,C} holds e3,e4 (ids 2,3)") {
    assert(t.edgesOf(sigAAC).toSeq == Seq(2, 3))
  }

  test("Table I: partition {A,A,B,C} holds e5,e6 (ids 4,5)") {
    assert(t.edgesOf(sigAABC).toSeq == Seq(4, 5))
  }

  test("Table I: inverted index posting lists ascend") {
    t.partitions.values.foreach { p =>
      p.inverted.values.foreach(pl => assert(pl.toSeq == pl.toSeq.sorted))
    }
  }

  test("Table I: inverted index of partition 3 (Example V.1 lookups)") {
    assert(t.incident(0, sigAABC).toSeq == Seq(4)) // he(v0, s) = {e5}
    assert(t.incident(1, sigAABC).toSeq == Seq(4))
    assert(t.incident(4, sigAABC).toSeq == Seq(4))
    assert(t.incident(5, sigAABC).toSeq == Seq(5))
  }

  test("incident returns empty for unknown vertex or signature") {
    assert(t.incident(0, sigAB).isEmpty)        // v0 not in any {A,B} edge
    assert(t.incident(0, Signature.of(Seq(7))).isEmpty)
  }

  test("cardinality is the partition row count (Def V.2)") {
    assert(t.cardinality(sigAB) == 2)
    assert(t.cardinality(sigAAC) == 2)
    assert(t.cardinality(sigAABC) == 2)
    assert(t.cardinality(Signature.of(Seq(0, 0))) == 0)
  }

  test("every hyperedge lands in exactly one partition") {
    val all = t.partitions.values.flatMap(_.edgeIds).toSeq.sorted
    assert(all == (0 until h.numEdges))
  }

  test("posting lists cover exactly the incidences of the partition") {
    t.partitions.foreach { case (sig, p) =>
      val fromPostings = p.inverted.toSeq.flatMap { case (v, es) => es.map(e => (v, e)) }.toSet
      val fromEdges = p.edgeIds.flatMap(e => h.edges(e).map(v => (v, e))).toSet
      assert(fromPostings == fromEdges, s"partition $sig")
    }
  }

  test("storage size is O(avg arity * |E|): counts all incidences") {
    // 18 incidences * 4B + signature headers (2+3+4 labels * 4B)
    assert(t.storageBytes == 18 * 4 + (2 + 3 + 4) * 4)
  }

  test("index size counts each edge a(e) times (Section IV-C analysis)") {
    // every incidence appears once in a posting list
    val postingEntries = t.partitions.values.flatMap(_.inverted.values.map(_.length)).sum
    assert(postingEntries == 18)
  }

  test("index and storage sizes are the same order (Exp-1 observation)") {
    val ratio = t.indexBytes.toDouble / t.storageBytes
    assert(ratio > 0.5 && ratio < 4.0)
  }

  test("build is deterministic") {
    val t2 = HyperedgeTables.build(h)
    assert(t2.partitions.keySet == t.partitions.keySet)
    t.partitions.keys.foreach { sig =>
      assert(t2.edgesOf(sig).toSeq == t.edgesOf(sig).toSeq)
    }
  }

  test("build time is recorded") {
    assert(t.buildNanos > 0)
  }
}
