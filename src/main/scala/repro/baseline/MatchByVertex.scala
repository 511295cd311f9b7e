package repro.baseline

import scala.collection.mutable
import repro.core.{Hypergraph, SetOps}

/** Result of a backtracking run.
  *
  * @param vertexMappings number of complete injective vertex mappings f
  * @param edgeTuples     number of distinct hyperedge tuples over those
  *                       mappings (HGMatch's counting semantics); -1 when
  *                       tuple collection was disabled
  * @param completed      false if the timeout expired
  */
final case class BacktrackOutcome(
    vertexMappings: Long,
    edgeTuples: Long,
    completed: Boolean,
    elapsedNanos: Long,
)

/** The generic match-by-vertex framework of Section III-B: Algorithm 1
  * extended with the subhypergraph matching constraint (Theorem III.2) and
  * IHS-filtered candidate vertex sets. CFL-H / DAF-H / CECI-H are this
  * enumerator under the matching orders of [[Orders]].
  *
  * Hyperedges are used only as a *verification* condition — exactly the
  * delayed-verification behaviour whose cost the paper quantifies.
  */
object MatchByVertex {

  /** Run the backtracking enumeration.
    *
    * @param order          query-vertex matching order (permutation of V(q))
    * @param candidateSets  per-query-vertex candidate data vertices (sorted)
    * @param collectTuples  also dedupe results to hyperedge tuples (test
    *                       scale only — keeps a set of tuples in memory)
    */
  def run(
      query: Hypergraph,
      data: Hypergraph,
      order: Array[Int],
      candidateSets: Array[Array[Int]],
      collectTuples: Boolean = false,
      timeoutNanos: Long = Long.MaxValue,
  ): BacktrackOutcome = {
    val t0 = System.nanoTime()
    val deadline = if (timeoutNanos == Long.MaxValue) Long.MaxValue else t0 + timeoutNanos
    require(order.sorted.sameElements(0 until query.numVertices), "order must permute V(q)")

    // Data hyperedge lookup by canonical vertex set (Theorem III.2 check).
    val edgeIdOf: mutable.HashMap[Vector[Int], Int] = {
      val m = mutable.HashMap.empty[Vector[Int], Int]
      (0 until data.numEdges).foreach(e => m(data.edges(e).toVector) = e)
      m
    }

    // Query hyperedges that become fully matched at each order position.
    val posOf = new Array[Int](query.numVertices)
    order.zipWithIndex.foreach { case (u, i) => posOf(u) = i }
    val edgesCompletedAt: Array[Array[Int]] = {
      val buckets = Array.fill(query.numVertices)(new mutable.ArrayBuilder.ofInt)
      (0 until query.numEdges).foreach { e =>
        val last = query.edges(e).map(posOf).max
        buckets(last) += e
      }
      buckets.map(_.result())
    }

    // For candidate refinement: an already-matched adjacent query vertex
    // (the earliest in the order), if any — standard local pruning shared
    // by the backtracking algorithms: f(u) must be adjacent to f(u').
    val pivotOf: Array[Int] = order.indices.map { i =>
      val u = order(i)
      val prior = query.adjacentVertices(u).filter(posOf(_) < i)
      if (prior.isEmpty) -1 else prior.minBy(posOf)
    }.toArray

    val f = Array.fill(query.numVertices)(-1)
    val used = new Array[Boolean](data.numVertices)
    var mappings = 0L
    val tuples = if (collectTuples) mutable.HashSet.empty[Vector[Int]] else null
    var steps = 0L
    var timedOut = false

    def tupleOf(): Vector[Int] =
      (0 until query.numEdges).map { e =>
        edgeIdOf(query.edges(e).map(f).sorted.toVector)
      }.toVector

    def enumerate(i: Int): Unit = {
      if (timedOut) return
      if (i == order.length) {
        mappings += 1
        if (tuples != null) tuples += tupleOf()
        return
      }
      val u = order(i)
      val base = candidateSets(u)
      val cands =
        if (pivotOf(i) >= 0) SetOps.intersect(base, data.adjacentVertices(f(pivotOf(i))))
        else base
      var ci = 0
      while (ci < cands.length && !timedOut) {
        val v = cands(ci)
        steps += 1
        if ((steps & 0xfff) == 0 && System.nanoTime() > deadline) timedOut = true
        if (!timedOut && !used(v)) {
          f(u) = v
          used(v) = true
          // Theorem III.2: every query hyperedge completed by this
          // assignment must map onto an existing data hyperedge.
          var ok = true
          val toCheck = edgesCompletedAt(i)
          var k = 0
          while (ok && k < toCheck.length) {
            ok = edgeIdOf.contains(query.edges(toCheck(k)).map(f).sorted.toVector)
            k += 1
          }
          if (ok) enumerate(i + 1)
          f(u) = -1
          used(v) = false
        }
        ci += 1
      }
    }

    enumerate(0)

    BacktrackOutcome(
      mappings,
      if (tuples != null) tuples.size.toLong else -1L,
      !timedOut,
      System.nanoTime() - t0,
    )
  }
}
