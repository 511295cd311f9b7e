package repro.core

import scala.collection.mutable

/** A vertex profile (Definition V.3), driver/plan-side form: the vertex's
  * label plus the set of *order positions* of the partial-query hyperedges
  * incident to it. Using order positions (not edge ids) makes query-side
  * and data-side profiles directly comparable: a data vertex's profile
  * lists the positions of the matched hyperedges that contain it.
  */
final case class Profile(label: Int, positions: Vector[Int]) extends Serializable

object Profile {
  implicit val ordering: Ordering[Profile] =
    Ordering.by((p: Profile) => (p.label, p.positions.mkString(",")))

  /** Canonical multiset form: sorted sequence. */
  def canon(ps: Seq[Profile]): Vector[Profile] = ps.sorted.toVector
}

/** One (adjacent previous hyperedge, shared query vertex) pair of Algorithm 4
  * lines 3–5: when expanding, the candidates contributed by this pair are
  * the union over V_incdt ⊆ f(order[prevPos]) of he(v, S(e_q)), where
  * V_incdt keeps data vertices with label `label` and partial-embedding
  * degree `degInPartial` (= d_{q'}(u)), minus the definitely-non-incident
  * vertex set.
  */
final case class PairSpec(prevPos: Int, label: Int, degInPartial: Int) extends Serializable

/** The plan for matching one query hyperedge at order position `pos` ≥ 1.
  *
  * Everything here depends only on the query and the matching order, so the
  * plan generator computes it once; it is tiny and ships inside closures to
  * Spark executors.
  *
  * @param queryEdge          query hyperedge id matched at this step
  * @param pos                0-based position in the matching order
  * @param signature          S(e_q) — selects the hyperedge table to probe
  * @param pairs              Algorithm-4 candidate pairs (never empty for a
  *                           connected order)
  * @param nonAdjPrevPos      positions of previously matched hyperedges
  *                           non-adjacent to `queryEdge` (their matched
  *                           vertices form V_n_incdt, Algorithm 4 line 1)
  * @param expectedProfiles   canonical multiset of query-side vertex
  *                           profiles of the vertices of `queryEdge` w.r.t.
  *                           the partial query after this step (Theorem V.2)
  * @param expectedVertexCount |V(q')| after this step (Observation V.5)
  * @param newVertexCount     vertices `queryEdge` adds over the previous
  *                           partial query — a valid prefix covers exactly
  *                           the previous |V(q')| data vertices, so the
  *                           Observation V.5 check reduces to counting the
  *                           candidate's fresh vertices (hot-path form)
  * @param expectedProfileKeys the profile multiset packed as sorted Longs,
  *                           `label << 32 | position-bitmask` — the hot
  *                           path compares sorted key arrays instead of
  *                           building Profile objects (requires
  *                           |E(q)| ≤ 32, enforced by [[Plan.fromOrder]])
  */
final case class ExpandStep(
    queryEdge: Int,
    pos: Int,
    signature: Signature,
    pairs: Array[PairSpec],
    nonAdjPrevPos: Array[Int],
    expectedProfiles: Vector[Profile],
    expectedVertexCount: Int,
    newVertexCount: Int,
    expectedProfileKeys: Array[Long],
) extends Serializable {
  /** nonAdjPrevPos as a mask for O(1) membership on the hot path. */
  val nonAdjMask: Long = nonAdjPrevPos.foldLeft(0L)((m, j) => m | (1L << j))
}

object Profiles {
  /** Pack a profile into its Long key. */
  def key(label: Int, positions: Iterable[Int]): Long =
    (label.toLong << 32) | positions.foldLeft(0L)((m, p) => m | (1L << p))
}

/** A full execution plan: SCAN(order(0)) → EXPAND(order(1)) → … → SINK.
  * `steps(i-1)` drives the EXPAND at order position `i`.
  */
final case class Plan(
    query: Hypergraph,
    order: Array[Int],
    scanSignature: Signature,
    steps: Array[ExpandStep],
) extends Serializable {
  def numEdges: Int = order.length
}

object Plan {

  /** Generate the plan for `query` against the indexed data hypergraph
    * (the online "Plan Generator" box of Fig 3).
    */
  def generate(query: Hypergraph, tables: HyperedgeTables): Plan =
    fromOrder(query, MatchingOrder.compute(query, tables))

  /** Cardinality-function form used by the Spark tier. */
  def generate(query: Hypergraph, cardOf: Signature => Long): Plan =
    fromOrder(query, MatchingOrder.compute(query, cardOf))

  /** Build a plan from an explicit matching order (any connected
    * permutation of E(q) — Section V-A notes HGMatch works with any).
    */
  def fromOrder(query: Hypergraph, order: Array[Int]): Plan = {
    require(order.sorted.sameElements(0 until query.numEdges), "order must permute E(q)")
    require(query.numEdges <= 32, "profile keys pack order positions into 32 bits")
    val steps = (1 until order.length).map(i => stepAt(query, order, i)).toArray
    Plan(query, order, query.signature(order(0)), steps)
  }

  private def stepAt(query: Hypergraph, order: Array[Int], i: Int): ExpandStep = {
    val eq = order(i)
    val eqVerts = query.edges(eq)

    // Partial-query degree of a query vertex before this step.
    def degBefore(u: Int): Int = (0 until i).count(j => SetOps.contains(query.edges(order(j)), u))

    val pairs = mutable.ArrayBuffer.empty[PairSpec]
    val nonAdj = mutable.ArrayBuffer.empty[Int]
    for (j <- 0 until i) {
      val prev = order(j)
      if (query.edgesAdjacent(prev, eq)) {
        // foreach u ∈ e ∩ e_q (Algorithm 4 line 4)
        query.edges(prev).foreach { u =>
          if (SetOps.contains(eqVerts, u))
            pairs += PairSpec(j, query.labels(u), degBefore(u))
        }
      } else nonAdj += j
    }

    // Query-side profiles of e_q's vertices in the partial query after the
    // step: label plus positions ≤ i of order hyperedges containing u.
    val profiles = eqVerts.toIndexedSeq.map { u =>
      val pos = (0 to i).filter(j => SetOps.contains(query.edges(order(j)), u)).toVector
      Profile(query.labels(u), pos)
    }

    val coveredBefore = mutable.HashSet.empty[Int]
    (0 until i).foreach(j => query.edges(order(j)).foreach(coveredBefore += _))
    val covered = coveredBefore.clone()
    query.edges(eq).foreach(covered += _)

    val canonProfiles = Profile.canon(profiles)
    ExpandStep(
      queryEdge = eq,
      pos = i,
      signature = query.signature(eq),
      pairs = pairs.toArray,
      nonAdjPrevPos = nonAdj.toArray,
      expectedProfiles = canonProfiles,
      expectedVertexCount = covered.size,
      newVertexCount = covered.size - coveredBefore.size,
      expectedProfileKeys = canonProfiles.map(p => Profiles.key(p.label, p.positions)).toArray.sorted,
    )
  }
}
