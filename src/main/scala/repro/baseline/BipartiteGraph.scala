package repro.baseline

import scala.collection.mutable
import repro.core.{Hypergraph, Signature}

/** Shared label space for bipartite conversion: original vertex labels keep
  * their ids; hyperedge signatures are interned into ids above
  * `signatureBase`. Query and data must be converted with the SAME interner
  * so signature labels line up.
  */
final class LabelInterner(val signatureBase: Int) {
  private val sigIds = mutable.LinkedHashMap.empty[Signature, Int]
  def sigLabel(s: Signature): Int =
    sigIds.getOrElseUpdate(s, signatureBase + sigIds.size)
}

/** The strawman bipartite conversion of Fig 2: every hyperedge becomes a
  * node (labelled with its signature), every original vertex stays a node
  * (with its label), incidences become edges. Signature labels make
  * RapidMatch-H *charitable*: conversion with plain labels filters less.
  *
  * @param labels         node labels (shared interned space)
  * @param adj            sorted adjacency lists
  * @param hyperedgeNode  hyperedge id → node id
  * @param vertexNode     original vertex id → node id
  */
final class BipartiteGraph(
    val labels: Array[Int],
    val adj: Array[Array[Int]],
    val hyperedgeNode: Array[Int],
    val vertexNode: Array[Int],
) {
  val numNodes: Int = labels.length
  def degree(n: Int): Int = adj(n).length
  /** node id of hyperedge-node → hyperedge id (or -1 for vertex-nodes). */
  val hyperedgeOfNode: Array[Int] = {
    val a = Array.fill(numNodes)(-1)
    hyperedgeNode.zipWithIndex.foreach { case (n, e) => a(n) = e }
    a
  }
  lazy val byLabel: Map[Int, Array[Int]] =
    (0 until numNodes).groupBy(labels).map { case (l, ns) => l -> ns.toArray.sorted }
}

object BipartiteGraph {

  /** Convert `h`: vertex-nodes first (ids 0 … |V|-1), then hyperedge-nodes. */
  def fromHypergraph(h: Hypergraph, interner: LabelInterner): BipartiteGraph = {
    val nv = h.numVertices
    val labels = new Array[Int](nv + h.numEdges)
    val adjB = Array.fill(nv + h.numEdges)(new mutable.ArrayBuilder.ofInt)
    (0 until nv).foreach(v => labels(v) = h.labels(v))
    (0 until h.numEdges).foreach { e =>
      val node = nv + e
      labels(node) = interner.sigLabel(h.signature(e))
      h.edges(e).foreach { v =>
        adjB(node) += v
        adjB(v) += node
      }
    }
    new BipartiteGraph(
      labels,
      adjB.map { b => val a = b.result(); java.util.Arrays.sort(a); a },
      Array.tabulate(h.numEdges)(nv + _),
      Array.tabulate(nv)(identity),
    )
  }
}
