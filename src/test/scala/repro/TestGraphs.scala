package repro

import scala.util.Random
import repro.core.Hypergraph

/** Shared test fixtures and tiny random hypergraph generators for
  * cross-engine agreement tests. Everything here is deterministic in its
  * seed.
  */
object TestGraphs {

  /** Small connected random hypergraph: `nv` vertices over `nl` labels,
    * `ne` hyperedges of arity 2..`maxArity`.
    */
  def random(nv: Int, ne: Int, nl: Int, maxArity: Int, seed: Long): Hypergraph = {
    val rnd = new Random(seed)
    val labels = Seq.fill(nv)(rnd.nextInt(nl))
    val edges = Seq.fill(ne) {
      val a = 2 + rnd.nextInt(math.max(1, maxArity - 1))
      Seq.fill(a)(rnd.nextInt(nv)).distinct
    }.filter(_.size >= 2)
    Hypergraph(labels, edges)
  }

  /** A connected query sampled as a sub-hypergraph of `data` (random-walk,
    * like the paper's workload) with `k` hyperedges; None if the data graph
    * cannot supply one.
    */
  def sampleQuery(data: Hypergraph, k: Int, seed: Long): Option[Hypergraph] = {
    import repro.data.{QuerySampler, QuerySetting}
    QuerySampler.sampleOnce(data, QuerySetting(s"q$k", k, 0, Int.MaxValue), new Random(seed),
      enforceVertexBounds = false)
  }
}
