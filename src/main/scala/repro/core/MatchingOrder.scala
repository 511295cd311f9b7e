package repro.core

import scala.collection.mutable

/** Matching-order computation (Definition V.1, Algorithm 3).
  *
  * Starts from the query hyperedge with minimal cardinality in the data
  * (Card is O(1) table metadata) and greedily appends the connected query
  * hyperedge minimising Card(e,H) / |V_φ ∩ e| — i.e. infrequent and highly
  * connected hyperedges are matched early.
  */
object MatchingOrder {

  /** Returns a permutation of the query's hyperedge ids. Every prefix is
    * connected provided the query hypergraph is connected (required by the
    * framework); if the query is disconnected this falls back to appending
    * the globally cheapest remaining hyperedge (documented deviation — the
    * paper assumes connected queries).
    */
  def compute(query: Hypergraph, tables: HyperedgeTables): Array[Int] =
    compute(query, sig => tables.cardinality(sig).toLong)

  /** Cardinality-function form — the Spark tier passes the driver-side
    * table metadata of [[repro.spark.HypergraphDF]] here.
    */
  def compute(query: Hypergraph, cardOf: Signature => Long): Array[Int] = {
    require(query.numEdges > 0, "query must have at least one hyperedge")
    val n = query.numEdges
    def card(e: Int): Long = cardOf(query.signature(e))

    val order = new mutable.ArrayBuffer[Int](n)
    val used = new Array[Boolean](n)
    val coveredVerts = mutable.HashSet.empty[Int]

    val first = (0 until n).minBy(e => (card(e), e))
    order += first; used(first) = true
    query.edges(first).foreach(coveredVerts += _)

    while (order.length < n) {
      var best = -1
      var bestScore = Double.PositiveInfinity
      var e = 0
      while (e < n) {
        if (!used(e)) {
          val shared = query.edges(e).count(coveredVerts.contains)
          if (shared > 0) {
            val score = card(e).toDouble / shared
            if (score < bestScore || (score == bestScore && (best == -1 || e < best))) {
              best = e; bestScore = score
            }
          }
        }
        e += 1
      }
      if (best == -1) best = (0 until n).filter(!used(_)).minBy(e => (card(e), e))
      order += best; used(best) = true
      query.edges(best).foreach(coveredVerts += _)
    }
    order.toArray
  }
}
