package repro.core

import scala.collection.mutable

/** Embedding validation (Algorithm 5): removes the false positives that
  * candidate generation may admit, using the vertex-count check
  * (Observation V.5) and vertex-profile multiset equality (Theorem V.2) —
  * no backtracking search over vertex mappings is ever performed.
  *
  * The two checks are exposed separately so engines can count how many
  * candidates each one filters (Exp-3, Fig 9: Candidates → Filtered →
  * Embeddings).
  */
object Validation {

  /** Observation V.5: the partial embedding extended with `candidate` must
    * cover exactly |V(q')| distinct data vertices.
    */
  def vertexCountOk(tables: HyperedgeTables, step: ExpandStep, emb: Array[Int], candidate: Int): Boolean = {
    val g = tables.graph
    val verts = mutable.HashSet.empty[Int]
    var j = 0
    while (j < step.pos) { g.edges(emb(j)).foreach(verts += _); j += 1 }
    g.edges(candidate).foreach(verts += _)
    verts.size == step.expectedVertexCount
  }

  /** Theorem V.2: multiset of data-side profiles of the new hyperedge's
    * vertices must equal the plan's query-side profile multiset. A data
    * vertex's profile is (label, sorted order-positions of the matched
    * hyperedges containing it — including this step's).
    */
  def profilesOk(tables: HyperedgeTables, step: ExpandStep, emb: Array[Int], candidate: Int): Boolean = {
    val g = tables.graph
    val dataProfiles = g.edges(candidate).toIndexedSeq.map { v =>
      val positions = mutable.ArrayBuffer.empty[Int]
      var p = 0
      while (p < step.pos) {
        if (SetOps.contains(g.edges(emb(p)), v)) positions += p
        p += 1
      }
      positions += step.pos
      Profile(g.labels(v), positions.toVector)
    }
    Profile.canon(dataProfiles) == step.expectedProfiles
  }

  /** Full Algorithm 5. The duplicate-edge reject is a fast path only: a
    * reused data hyperedge always fails the profile check (distinct query
    * hyperedges share at most a strict subset of their vertices, so some
    * query-side profile lacks the earlier position).
    */
  def isValid(tables: HyperedgeTables, step: ExpandStep, emb: Array[Int], candidate: Int): Boolean = {
    var j = 0
    while (j < step.pos) { if (emb(j) == candidate) return false; j += 1 }
    vertexCountOk(tables, step, emb, candidate) && profilesOk(tables, step, emb, candidate)
  }

  // ------------------------------------------------------------------
  // Hot-path form used by the engines: identical semantics, profiles
  // packed into Long keys (label << 32 | position-bitmask), no per-call
  // hash structures. The incremental vertex-count check relies on the
  // engines only ever extending *validated* prefixes (a valid prefix
  // covers exactly the previous step's |V(q')| data vertices).
  // ------------------------------------------------------------------

  /** Fill `keys` (length ≥ arity of candidate) with the packed profile of
    * each candidate vertex and return the number of vertices that are new
    * w.r.t. the partial embedding.
    */
  def profileKeys(tables: HyperedgeTables, step: ExpandStep, emb: Array[Int],
                  candidate: Int, keys: Array[Long]): Int = {
    val g = tables.graph
    val cvs = g.edges(candidate)
    val freshMask = 1L << step.pos
    var fresh = 0
    var i = 0
    while (i < cvs.length) {
      val v = cvs(i)
      var mask = freshMask
      var j = 0
      while (j < step.pos) {
        if (SetOps.contains(g.edges(emb(j)), v)) mask |= 1L << j
        j += 1
      }
      if (mask == freshMask) fresh += 1
      keys(i) = (g.labels(v).toLong << 32) | mask
      i += 1
    }
    fresh
  }

  /** Observation V.5 in incremental form (valid prefix assumed). */
  def freshCountOk(step: ExpandStep, fresh: Int): Boolean = fresh == step.newVertexCount

  /** Theorem V.2 on packed keys: sort and compare with the plan's. */
  def profileKeysOk(step: ExpandStep, keys: Array[Long], n: Int): Boolean = {
    java.util.Arrays.sort(keys, 0, n)
    val exp = step.expectedProfileKeys
    if (n != exp.length) return false
    var i = 0
    while (i < n) { if (keys(i) != exp(i)) return false; i += 1 }
    true
  }
}
