package repro.data

import org.scalatest.funsuite.AnyFunSuite

class HypergraphGenSpec extends AnyFunSuite {

  private val cfg = HgConfig("test", numVertices = 500, numEdges = 800, numLabels = 5,
    maxArity = 20, meanArity = 5.0, seed = 9L)
  private val g = HypergraphGen.generate(cfg)

  test("respects vertex count") {
    assert(g.numVertices == 500)
  }

  test("produces close to the requested edge count") {
    assert(g.numEdges >= cfg.numEdges * 9 / 10)
    assert(g.numEdges <= cfg.numEdges)
  }

  test("respects max arity") {
    assert(g.maxArity <= cfg.maxArity)
    assert((0 until g.numEdges).forall(e => g.arity(e) >= 2))
  }

  test("mean arity lands near the target") {
    assert(g.avgArity > cfg.meanArity * 0.5 && g.avgArity < cfg.meanArity * 2.0,
      s"avgArity=${g.avgArity}")
  }

  test("uses close to the requested label count") {
    assert(g.numLabels >= 2 && g.numLabels <= cfg.numLabels)
  }

  test("labels are zipf-skewed: most frequent label dominates") {
    val counts = g.labels.groupBy(identity).view.mapValues(_.length).toMap
    assert(counts(0) >= counts.getOrElse(cfg.numLabels - 1, 0))
  }

  test("no repeated hyperedges") {
    val canon = g.edges.map(_.toVector)
    assert(canon.distinct.length == canon.length)
  }

  test("deterministic in the seed") {
    val g2 = HypergraphGen.generate(cfg)
    assert(g2.numEdges == g.numEdges)
    assert((0 until g.numEdges).forall(e => g2.edges(e).sameElements(g.edges(e))))
    assert(g2.labels.sameElements(g.labels))
  }

  test("different seed gives a different graph") {
    val g2 = HypergraphGen.generate(cfg.copy(seed = 10L))
    assert(!(0 until math.min(g.numEdges, g2.numEdges)).forall(e => g2.edges(e).sameElements(g.edges(e))))
  }

  test("preferential attachment produces skewed degrees") {
    val degs = (0 until g.numVertices).map(g.degree)
    assert(degs.max > 3 * (degs.sum.toDouble / degs.length), s"max=${degs.max} avg=${degs.sum.toDouble / degs.length}")
  }

  test("label coherence produces single-label hyperedges") {
    val coh = HypergraphGen.generate(cfg.copy(labelCoherence = 1.0, seed = 21L))
    val singleLabel = (0 until coh.numEdges).count { e =>
      coh.edges(e).map(coh.labels).distinct.length == 1
    }
    assert(singleLabel == coh.numEdges)
  }

  test("label coherence concentrates signatures into fewer partitions") {
    val flat = HypergraphGen.generate(cfg.copy(labelCoherence = 0.0, numLabels = 10, seed = 22L))
    val coh = HypergraphGen.generate(cfg.copy(labelCoherence = 1.0, numLabels = 10, seed = 22L))
    def partitions(h: repro.core.Hypergraph): Int =
      (0 until h.numEdges).map(h.signature).distinct.size
    assert(partitions(coh) < partitions(flat))
  }

  test("coherence 0 leaves mixed-label edges (control)") {
    val flat = HypergraphGen.generate(cfg.copy(labelCoherence = 0.0, numLabels = 5, seed = 23L))
    val mixed = (0 until flat.numEdges).count { e =>
      flat.edges(e).map(flat.labels).distinct.length > 1
    }
    assert(mixed > flat.numEdges / 2)
  }
}
