package repro.data

import scala.collection.mutable
import scala.util.Random
import repro.core.Hypergraph

/** Configuration for one synthetic hypergraph (a scaled analogue of a
  * Table II dataset — see DESIGN.md substitutions).
  *
  * @param numVertices target |V|
  * @param numEdges    target |E| (deduplication may drop a few)
  * @param numLabels   target |Σ| — labels drawn zipf-skewed so frequent
  *                    labels dominate, like real vertex types
  * @param maxArity    hard arity cap (a_max)
  * @param meanArity   lognormal location for arity draws (ā lands nearby)
  * @param aritySigma  lognormal shape: larger ⇒ heavier arity tail
  * @param labelZipf   label skew exponent (0 = uniform)
  * @param prefAttach  probability that a vertex slot is filled by
  *                    preferential attachment (power-law degrees, the
  *                    load-skew driver of Section VI-C)
  * @param labelCoherence probability that a hyperedge is label-coherent:
  *                    all its vertices drawn from one zipf-chosen "home
  *                    label" pool. Real n-ary facts (items per shopping
  *                    trip, products per reviewer) concentrate in one
  *                    category, which is what gives real hypergraphs
  *                    large same-signature partitions — the substrate of
  *                    the paper's heavy parallel workloads.
  */
final case class HgConfig(
    name: String,
    numVertices: Int,
    numEdges: Int,
    numLabels: Int,
    maxArity: Int,
    meanArity: Double,
    aritySigma: Double = 0.7,
    labelZipf: Double = 0.8,
    prefAttach: Double = 0.6,
    labelCoherence: Double = 0.0,
    seed: Long = 42L,
)

/** Deterministic synthetic hypergraph generator. Properties preserved from
  * the originals: label count and skew, arity mean/max, power-law vertex
  * degrees, |V|/|E| ratio. Repeated hyperedges and in-edge duplicate
  * vertices never occur (paper preprocessing).
  */
object HypergraphGen {

  def generate(cfg: HgConfig): Hypergraph = {
    val rnd = new Random(cfg.seed)

    // Labels: zipf over label ids.
    val labelCdf = {
      val w = Array.tabulate(cfg.numLabels)(l => 1.0 / math.pow(l + 1.0, cfg.labelZipf))
      val total = w.sum
      var acc = 0.0
      w.map { x => acc += x / total; acc }
    }
    def drawLabel(): Int = {
      val u = rnd.nextDouble()
      val i = java.util.Arrays.binarySearch(labelCdf, u)
      math.min(cfg.numLabels - 1, if (i >= 0) i else -i - 1)
    }
    val labels = Array.fill(cfg.numVertices)(drawLabel())

    // Arity: truncated lognormal around meanArity.
    val mu = math.log(math.max(1.0, cfg.meanArity)) - cfg.aritySigma * cfg.aritySigma / 2.0
    def drawArity(): Int = {
      val a = math.round(math.exp(rnd.nextGaussian() * cfg.aritySigma + mu)).toInt
      math.min(cfg.maxArity, math.min(cfg.numVertices, math.max(2, a)))
    }

    // Vertex picks: preferential attachment via incidence bags — one
    // global bag, plus one per label for coherent edges.
    val bag = new mutable.ArrayBuffer[Int](cfg.numEdges * math.max(2, cfg.meanArity.toInt))
    val pools: Array[Array[Int]] = {
      val b = Array.fill(cfg.numLabels)(new mutable.ArrayBuilder.ofInt)
      labels.zipWithIndex.foreach { case (l, v) => b(l) += v }
      b.map(_.result())
    }
    val labelBags = Array.fill(cfg.numLabels)(new mutable.ArrayBuffer[Int])
    def drawVertex(): Int =
      if (bag.nonEmpty && rnd.nextDouble() < cfg.prefAttach) bag(rnd.nextInt(bag.length))
      else rnd.nextInt(cfg.numVertices)
    def drawVertexIn(l: Int): Int = {
      val lb = labelBags(l)
      if (lb.nonEmpty && rnd.nextDouble() < cfg.prefAttach) lb(rnd.nextInt(lb.length))
      else pools(l)(rnd.nextInt(pools(l).length))
    }

    val seen = mutable.HashSet.empty[Vector[Int]]
    val edges = mutable.ArrayBuffer.empty[Seq[Int]]
    var attempts = 0
    val maxAttempts = cfg.numEdges * 20
    while (edges.length < cfg.numEdges && attempts < maxAttempts) {
      attempts += 1
      val coherent = rnd.nextDouble() < cfg.labelCoherence
      val home = if (coherent) drawLabel() else -1
      val poolSize = if (coherent) pools(home).length else cfg.numVertices
      val a = math.min(drawArity(), poolSize)
      val vs = mutable.LinkedHashSet.empty[Int]
      var tries = 0
      while (vs.size < a && tries < a * 20) {
        vs += (if (coherent) drawVertexIn(home) else drawVertex())
        tries += 1
      }
      if (vs.size >= 2) {
        val canon = vs.toVector.sorted
        if (seen.add(canon)) {
          edges += canon
          canon.foreach { v =>
            bag += v
            labelBags(labels(v)) += v
          }
        }
      }
    }
    Hypergraph(labels.toIndexedSeq, edges.toSeq)
  }
}
