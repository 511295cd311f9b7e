package repro.core

import scala.collection.mutable

/** The "indexed data hypergraph" of Section IV: signature-partitioned
  * hyperedge tables (IV-B) plus a per-partition inverted hyperedge index
  * (IV-C) and the cardinality metadata the plan generator reads (V-A).
  *
  * One [[Partition]] corresponds to one hyperedge table of Table I: the `E`
  * column is `edgeIds`, the `I` column is `inverted`. Posting lists are
  * ascending edge-id arrays, so candidate generation (Algorithm 4) runs as
  * sorted-set unions/intersections straight off the index.
  */
final class HyperedgeTables private (
    val graph: Hypergraph,
    val partitions: Map[Signature, HyperedgeTables.Partition],
    val buildNanos: Long,
) extends Serializable {

  /** Card(e_q, H) of Definition V.2 — number of rows in the partition with
    * the query hyperedge's signature; O(1) off the table metadata.
    */
  def cardinality(sig: Signature): Int =
    partitions.get(sig).map(_.edgeIds.length).getOrElse(0)

  /** he(v, s): incident hyperedges of `v` restricted to signature `s`,
    * fetched from the inverted index in O(1) (plus the list itself).
    */
  def incident(v: Int, sig: Signature): Array[Int] =
    partitions.get(sig) match {
      case Some(p) => p.inverted.getOrElse(v, SetOps.empty)
      case None    => SetOps.empty
    }

  /** All hyperedge ids in the partition for `sig` (the SCAN operator input). */
  def edgesOf(sig: Signature): Array[Int] =
    partitions.get(sig).map(_.edgeIds).getOrElse(SetOps.empty)

  /** Estimated size in bytes of the raw hyperedge tables: 4 bytes per
    * incidence entry plus one signature header per partition — the
    * O(ā_H·|E(H)|) bound of Section IV-B.
    */
  def storageBytes: Long =
    partitions.valuesIterator.map { p =>
      4L * p.edgeIds.iterator.map(graph.arity(_).toLong).sum + 4L * p.signature.arity
    }.sum

  /** Estimated size in bytes of the inverted index: each hyperedge id
    * appears in a(e) posting lists — the O(ā_H·|E(H)|) bound of IV-C.
    */
  def indexBytes: Long =
    partitions.valuesIterator.map { p =>
      p.inverted.valuesIterator.map(4L * _.length).sum + 8L * p.inverted.size
    }.sum
}

object HyperedgeTables {

  /** One hyperedge table: all data hyperedges sharing `signature`, plus its
    * inverted hyperedge index (vertex → ascending posting list of edge ids).
    */
  final class Partition(
      val signature: Signature,
      val edgeIds: Array[Int],
      val inverted: Map[Int, Array[Int]],
  ) extends Serializable

  /** Offline preprocessing (Section IV-A, left half of Fig 3): group the
    * hyperedges by signature and build the inverted index of each table.
    */
  def build(graph: Hypergraph): HyperedgeTables = {
    val t0 = System.nanoTime()
    val bySig = mutable.LinkedHashMap.empty[Signature, mutable.ArrayBuilder.ofInt]
    var e = 0
    while (e < graph.numEdges) {
      bySig.getOrElseUpdate(graph.signature(e), new mutable.ArrayBuilder.ofInt) += e
      e += 1
    }
    val parts = bySig.iterator.map { case (sig, ids) =>
      val edgeIds = ids.result() // ascending: built in edge-id order
      val inv = mutable.HashMap.empty[Int, mutable.ArrayBuilder.ofInt]
      edgeIds.foreach { eid =>
        graph.edges(eid).foreach(v => inv.getOrElseUpdate(v, new mutable.ArrayBuilder.ofInt) += eid)
      }
      sig -> new Partition(sig, edgeIds, inv.iterator.map { case (v, b) => v -> b.result() }.toMap)
    }.toMap
    new HyperedgeTables(graph, parts, System.nanoTime() - t0)
  }
}
