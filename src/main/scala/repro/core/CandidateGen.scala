package repro.core

/** Candidate generation (Algorithm 4): given a partial embedding
  * `emb` = data hyperedge ids for order positions 0 … step.pos-1, produce
  * all candidate data hyperedges for the query hyperedge at `step.pos`
  * using only set operations over the inverted hyperedge index.
  */
object CandidateGen {

  /** Reusable per-thread buffers for the hot path: the running
    * intersection `a` and the per-pair gather buffer `b`. One [[Scratch]]
    * per worker thread; `candidates` is reentrancy-free.
    */
  final class Scratch {
    var a: Array[Int] = new Array[Int](256)
    var b: Array[Int] = new Array[Int](256)
    var na: Int = 0
    def ensureB(n: Int): Unit =
      if (b.length < n) b = new Array[Int](Integer.highestOneBit(n - 1) << 1)
    def ensureA(n: Int): Unit =
      if (a.length < n) a = new Array[Int](Integer.highestOneBit(n - 1) << 1)
  }

  /** Algorithm 4 into caller-provided scratch. On return, the candidates
    * are `scratch.a(0 until scratch.na)`, sorted ascending.
    *
    * Per pair, posting lists are gathered, sorted and deduped (the
    * within-pair union), then merged into the running intersection in
    * place — no per-call allocations beyond buffer growth. The per-vertex
    * partial-embedding degree (Obs V.4) and V_n_incdt membership (Obs
    * V.3) come from one membership sweep over the ≤ |E(q)| matched
    * hyperedges.
    */
  def candidatesInto(tables: HyperedgeTables, step: ExpandStep, emb: Array[Int],
                     scratch: Scratch): Unit = {
    val g = tables.graph
    scratch.na = 0
    var k = 0
    while (k < step.pairs.length) {
      val p = step.pairs(k)
      val fe = g.edges(emb(p.prevPos))

      // Gather the pair's posting lists into b.
      var nb = 0
      var i = 0
      while (i < fe.length) {
        val v = fe(i)
        if (g.labels(v) == p.label) {
          // degInM(v) and the non-incident exclusion in one sweep
          var deg = 0
          var nonIncident = false
          var j = 0
          while (j < step.pos && !nonIncident) {
            if (SetOps.contains(g.edges(emb(j)), v)) {
              deg += 1
              if ((step.nonAdjMask & (1L << j)) != 0L) nonIncident = true
            }
            j += 1
          }
          if (!nonIncident && deg == p.degInPartial) {
            val post = tables.incident(v, step.signature)
            scratch.ensureB(nb + post.length)
            System.arraycopy(post, 0, scratch.b, nb, post.length)
            nb += post.length
          }
        }
        i += 1
      }
      if (nb == 0) { scratch.na = 0; return } // empty pair ⇒ empty intersection

      // Within-pair union: sort + dedupe in place.
      java.util.Arrays.sort(scratch.b, 0, nb)
      var w = 0
      var r = 0
      while (r < nb) {
        val x = scratch.b(r)
        if (w == 0 || scratch.b(w - 1) != x) { scratch.b(w) = x; w += 1 }
        r += 1
      }
      nb = w

      if (k == 0) {
        scratch.ensureA(nb)
        System.arraycopy(scratch.b, 0, scratch.a, 0, nb)
        scratch.na = nb
      } else {
        // Line 7 incrementally: a ← a ∩ b, merged in place.
        var ia = 0; var ib = 0; var out = 0
        while (ia < scratch.na && ib < nb) {
          val x = scratch.a(ia); val y = scratch.b(ib)
          if (x == y) { scratch.a(out) = x; out += 1; ia += 1; ib += 1 }
          else if (x < y) ia += 1
          else ib += 1
        }
        scratch.na = out
      }
      if (scratch.na == 0) return
      k += 1
    }
  }

  /** Algorithm 4, allocating form (tests and non-hot callers). */
  def candidates(tables: HyperedgeTables, step: ExpandStep, emb: Array[Int]): Array[Int] = {
    val s = new Scratch
    candidatesInto(tables, step, emb, s)
    java.util.Arrays.copyOf(s.a, s.na)
  }
}
