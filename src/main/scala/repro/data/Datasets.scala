package repro.data

import scala.collection.mutable
import repro.core.{Hypergraph, HyperedgeTables}

/** The 10 datasets of Table II as deterministic synthetic analogues.
  *
  * Paper sizes (|V| / |E| / |Σ| / a_max / ā):
  *   HC 1,290/331/2/81/34.8          MA 73,851/5,444/1,456/1,784/24.2
  *   CH 327/7,818/9/5/2.3            CP 242/12,704/11/5/2.4
  *   SB 294/20,584/2/99/8.0          HB 1,494/52,960/2/399/20.5
  *   WT 88,860/65,507/11/25/6.6      TC 172,738/212,483/160/85/4.1
  *   SA 15.2M/1.10M/56,502/61,315/23.7   AR 2.27M/4.24M/29/9,350/17.1
  *
  * Small datasets are generated near full size; large ones are scaled down
  * ~10–400× with |V|/|E| ratio, |Σ|, arity shape, and label/degree skew
  * preserved (offline container — see DESIGN.md substitutions). Measured
  * stats per generated analogue are reported by TableIIDatasetsBench next
  * to the paper's numbers.
  */
object Datasets {

  val configs: Seq[HgConfig] = Seq(
    //        name  |V|    |E|    |Σ|  aMax aMean sigma zipf pref  seed
    HgConfig("HC", 1290, 331, 2, 81, 30.0, 0.55, 0.3, 0.35, 101L),
    HgConfig("MA", 7385, 1100, 150, 180, 18.0, 0.85, 1.0, 0.55, 102L),
    HgConfig("CH", 327, 2600, 9, 5, 2.3, 0.30, 0.6, 0.55, 103L),
    HgConfig("CP", 242, 3200, 11, 5, 2.4, 0.30, 0.6, 0.55, 104L),
    HgConfig("SB", 294, 1500, 2, 60, 8.0, 0.75, 0.3, 0.45, 105L),
    HgConfig("HB", 1494, 2000, 2, 150, 18.0, 0.75, 0.3, 0.45, 106L),
    HgConfig("WT", 8886, 6550, 11, 25, 6.6, 0.55, 0.8, 0.5, 107L),
    HgConfig("TC", 8640, 10620, 160, 85, 4.1, 0.65, 1.0, 0.5, 108L),
    HgConfig("SA", 30000, 2200, 2000, 600, 20.0, 0.95, 1.1, 0.5, 109L),
    // AR hyperedges are the products one user reviewed and concentrate in
    // one of the 29 categories; labelCoherence ≈ 1 reproduces the large
    // same-signature partitions that make real AR q3 queries carry 10⁸+
    // embeddings (the Exp-4/5/6 workloads).
    HgConfig("AR", 50000, 100000, 29, 300, 15.0, 0.75,
      labelZipf = 1.0, prefAttach = 0.65, labelCoherence = 0.95, seed = 110L),
  )

  val names: Seq[String] = configs.map(_.name)

  /** Datasets used for single-thread comparisons (paper: all but AR). */
  val singleThreadNames: Seq[String] = names.filterNot(_ == "AR")

  private val graphCache = mutable.HashMap.empty[String, Hypergraph]
  private val tableCache = mutable.HashMap.empty[String, HyperedgeTables]

  def config(name: String): HgConfig =
    configs.find(_.name == name).getOrElse(throw new NoSuchElementException(s"unknown dataset $name"))

  /** Generate (and cache) the analogue hypergraph. */
  def graph(name: String): Hypergraph = synchronized {
    graphCache.getOrElseUpdate(name, HypergraphGen.generate(config(name)))
  }

  /** Build (and cache) the indexed data hypergraph. */
  def tables(name: String): HyperedgeTables = synchronized {
    tableCache.getOrElseUpdate(name, HyperedgeTables.build(graph(name)))
  }

  /** One Table-II-style stats row for a generated analogue. */
  final case class Stats(
      name: String, numVertices: Int, numEdges: Int, numLabels: Int,
      maxArity: Int, avgArity: Double, indexBytes: Long, storageBytes: Long,
      buildMillis: Double,
  )

  def stats(name: String): Stats = {
    val g = graph(name)
    val t = tables(name)
    Stats(name, g.numVertices, g.numEdges, g.numLabels, g.maxArity, g.avgArity,
      t.indexBytes, t.storageBytes, t.buildNanos / 1e6)
  }
}
