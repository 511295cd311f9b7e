package repro.data

import scala.collection.mutable
import scala.util.Random
import repro.core.Hypergraph

/** A query-workload setting, one row of Table III. */
final case class QuerySetting(name: String, numEdges: Int, vMin: Int, vMax: Int)

object QuerySetting {
  /** Table III verbatim: q2(2,5,15), q3(3,10,20), q4(4,10,30), q6(6,15,35). */
  val q2: QuerySetting = QuerySetting("q2", 2, 5, 15)
  val q3: QuerySetting = QuerySetting("q3", 3, 10, 20)
  val q4: QuerySetting = QuerySetting("q4", 4, 10, 30)
  val q6: QuerySetting = QuerySetting("q6", 6, 15, 35)
  val all: Seq[QuerySetting] = Seq(q2, q3, q4, q6)
}

/** Random-walk query sampling (Section VII-A): a query is a connected
  * subhypergraph of the data hypergraph with a given number of hyperedges
  * and a vertex count within [vMin, vMax] — so at least one embedding is
  * guaranteed to exist.
  */
object QuerySampler {

  /** One random-walk draw: start at a random hyperedge, repeatedly hop to a
    * random incident hyperedge of a random covered vertex until `numEdges`
    * distinct hyperedges are collected. Returns the induced query
    * hypergraph (vertices compacted, labels preserved in the data graph's
    * label space) or None if the walk got stuck / vertex bound failed.
    */
  def sampleOnce(data: Hypergraph, setting: QuerySetting, rnd: Random,
                 enforceVertexBounds: Boolean = true,
                 edgeFilter: Int => Boolean = _ => true): Option[Hypergraph] = {
    if (data.numEdges < setting.numEdges) return None
    val eligible = (0 until data.numEdges).filter(edgeFilter)
    if (eligible.size < setting.numEdges) return None
    val edges = mutable.LinkedHashSet(eligible(rnd.nextInt(eligible.size)))
    val verts = mutable.ArrayBuffer.empty[Int]
    data.edges(edges.head).foreach(verts += _)
    var stuck = 0
    while (edges.size < setting.numEdges && stuck < 50) {
      val v = verts(rnd.nextInt(verts.length))
      val inc = data.incidence(v)
      val e = inc(rnd.nextInt(inc.length))
      if (edgeFilter(e) && edges.add(e)) {
        data.edges(e).foreach(u => if (!verts.contains(u)) verts += u)
        stuck = 0
      } else stuck += 1
    }
    if (edges.size < setting.numEdges) return None
    if (enforceVertexBounds && (verts.size < setting.vMin || verts.size > setting.vMax)) return None
    Some(induced(data, edges.toSeq))
  }

  /** Sample queries whose hyperedges all come from well-populated signature
    * partitions (Card ≥ `minCard`) — the paper's Exp-4/5/6 deliberately use
    * q3 queries "with a large number of embeddings"; walking only through
    * frequent signatures is how such queries arise.
    */
  def sampleHeavy(data: Hypergraph, tables: repro.core.HyperedgeTables,
                  numEdges: Int, count: Int, seed: Long, minCard: Int = 20,
                  tries: Int = 3000): Seq[Hypergraph] = {
    val rnd = new Random(seed)
    val setting = QuerySetting(s"heavy$numEdges", numEdges, 0, Int.MaxValue)
    def frequent(e: Int): Boolean = tables.cardinality(data.signature(e)) >= minCard
    val out = mutable.ArrayBuffer.empty[Hypergraph]
    var t = 0
    while (out.length < count && t < tries) {
      sampleOnce(data, setting, rnd, enforceVertexBounds = false, edgeFilter = frequent)
        .foreach(out += _)
      t += 1
    }
    out.toSeq
  }

  /** Sample chain-shaped queries: `numEdges` hyperedges where consecutive
    * edges share exactly one vertex and non-consecutive edges are disjoint,
    * every edge drawn from a signature partition with Card ≥ `minCard`.
    * Chains minimise overlap constraints, so among sampled subhypergraphs
    * they carry the largest embedding counts — the Exp-4/5/6 workload shape
    * (the paper's q3¹/q3² have 10⁸–10¹⁰ results).
    */
  def sampleChains(data: Hypergraph, tables: repro.core.HyperedgeTables,
                   numEdges: Int, count: Int, seed: Long, minCard: Int = 20,
                   tries: Int = 4000): Seq[Hypergraph] = {
    val rnd = new Random(seed)
    def frequent(e: Int): Boolean = tables.cardinality(data.signature(e)) >= minCard
    val eligible = (0 until data.numEdges).filter(frequent)
    if (eligible.isEmpty) return Seq.empty
    val out = mutable.ArrayBuffer.empty[Hypergraph]
    var t = 0
    while (out.length < count && t < tries) {
      t += 1
      val chain = mutable.ArrayBuffer(eligible(rnd.nextInt(eligible.size)))
      val used = mutable.HashSet.empty[Int]
      data.edges(chain.head).foreach(used += _)
      var ok = true
      while (ok && chain.length < numEdges) {
        val last = chain.last
        // hop vertices: in the last edge but in no earlier chain edge,
        // so non-consecutive edges stay disjoint
        val prevUsed = chain.init.iterator.flatMap(data.edges(_)).toSet
        val hopVerts = data.edges(last).filterNot(prevUsed.contains)
        val candidates = for {
          v <- rnd.shuffle(hopVerts.toSeq).iterator
          e <- rnd.shuffle(data.incidence(v).toSeq).iterator
          if frequent(e) && !chain.contains(e)
          evs = data.edges(e)
          // exactly one shared vertex with the whole chain so far: v
          if evs.count(used.contains) == 1 && evs.contains(v)
        } yield e
        candidates.nextOption() match {
          case Some(e) => chain += e; data.edges(e).foreach(used += _)
          case None    => ok = false
        }
      }
      if (ok && chain.length == numEdges) out += induced(data, chain.toSeq)
    }
    out.toSeq
  }

  /** Build the query hypergraph induced by `edgeIds`, with compact vertex ids. */
  def induced(data: Hypergraph, edgeIds: Seq[Int]): Hypergraph = {
    val vmap = mutable.LinkedHashMap.empty[Int, Int]
    edgeIds.foreach(e => data.edges(e).foreach(v => vmap.getOrElseUpdate(v, vmap.size)))
    Hypergraph(
      labels = vmap.keysIterator.map(data.labels).toSeq,
      rawEdges = edgeIds.map(e => data.edges(e).toIndexedSeq.map(vmap)),
    )
  }

  /** Sample `count` queries for a setting (paper: 20 per setting). If the
    * strict vertex bounds are unreachable on a dataset (e.g. low-arity
    * graphs cannot reach |V|min with few edges), the bound is relaxed after
    * `strictTries` draws — queries are still connected random subhypergraphs
    * of the requested edge count.
    */
  def sample(data: Hypergraph, setting: QuerySetting, count: Int, seed: Long,
             strictTries: Int = 400): Seq[Hypergraph] = {
    val rnd = new Random(seed)
    val out = mutable.ArrayBuffer.empty[Hypergraph]
    var tries = 0
    while (out.length < count && tries < strictTries) {
      sampleOnce(data, setting, rnd).foreach(out += _)
      tries += 1
    }
    var relaxedTries = 0
    while (out.length < count && relaxedTries < strictTries) {
      sampleOnce(data, setting, rnd, enforceVertexBounds = false).foreach(out += _)
      relaxedTries += 1
    }
    out.toSeq
  }
}
