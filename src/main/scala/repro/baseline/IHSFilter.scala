package repro.baseline

import scala.collection.mutable
import repro.core.{Hypergraph, Signature}

/** Per-vertex structures backing the incident-hyperedge-structure (IHS)
  * filter of Section III-B (from Ha et al. [30]): arity histograms of
  * incident hyperedges and the signatures present per arity.
  */
final class IHSIndex(val g: Hypergraph) {

  /** he^a histograms: arityHist(v)(a) = |he^a(v)|. */
  val arityHist: Array[Map[Int, Int]] =
    Array.tabulate(g.numVertices) { v =>
      g.incidence(v).toIndexedSeq.groupBy(g.arity).map { case (a, es) => a -> es.size }
    }

  /** Signatures of incident hyperedges, grouped by arity. */
  val sigsByArity: Array[Map[Int, Set[Signature]]] =
    Array.tabulate(g.numVertices) { v =>
      g.incidence(v).toIndexedSeq.groupBy(g.arity).map { case (a, es) =>
        a -> es.map(g.signature).toSet
      }
    }

  /** Data vertices grouped by label, for cheap first-condition scans. */
  lazy val byLabel: Map[Int, Array[Int]] =
    (0 until g.numVertices).groupBy(g.labels).map { case (l, vs) => l -> vs.toArray.sorted }
}

/** The IHS candidate-vertex filter: data vertex v is a candidate for query
  * vertex u iff the four Section III-B conditions hold.
  */
object IHSFilter {

  /** All four conditions for a single (u, v) pair. */
  def admits(qIdx: IHSIndex, dIdx: IHSIndex, u: Int, v: Int): Boolean = {
    val q = qIdx.g; val d = dIdx.g
    // 1. degree and label
    if (q.labels(u) != d.labels(v) || q.degree(u) > d.degree(v)) return false
    // 2. number of adjacent vertices
    if (q.adjacentVertices(u).length > d.adjacentVertices(v).length) return false
    // 3. arity containment: ∀a, |he^a(u)| ≤ |he^a(v)|
    val qh = qIdx.arityHist(u); val dh = dIdx.arityHist(v)
    if (!qh.forall { case (a, c) => dh.getOrElse(a, 0) >= c }) return false
    // 4. hyperedge labels: per arity present at u, some incident hyperedge
    //    pair (e1 at u, e2 at v) has identical per-label vertex counts —
    //    i.e. equal signatures.
    qIdx.sigsByArity(u).forall { case (a, qsigs) =>
      dIdx.sigsByArity(v).get(a).exists(dsigs => qsigs.exists(dsigs.contains))
    }
  }

  /** Candidate set per query vertex (sorted data-vertex ids). */
  def candidates(qIdx: IHSIndex, dIdx: IHSIndex): Array[Array[Int]] = {
    Array.tabulate(qIdx.g.numVertices) { u =>
      val pool = dIdx.byLabel.getOrElse(qIdx.g.labels(u), Array.emptyIntArray)
      val out = new mutable.ArrayBuilder.ofInt
      pool.foreach(v => if (admits(qIdx, dIdx, u, v)) out += v)
      out.result()
    }
  }
}
