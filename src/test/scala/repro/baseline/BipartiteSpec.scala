package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Hypergraph

class BipartiteSpec extends AnyFunSuite {

  private val h = Hypergraph.fig1Data

  test("conversion inflates as in Fig 2: |V|+|E| nodes, Σa(e) edges") {
    val g = BipartiteGraph.fromHypergraph(h, new LabelInterner(3))
    assert(g.numNodes == h.numVertices + h.numEdges)
    assert(g.adj.map(_.length).sum == 2 * h.totalIncidence) // each incidence twice
  }

  test("vertex-nodes keep their labels") {
    val g = BipartiteGraph.fromHypergraph(h, new LabelInterner(3))
    (0 until h.numVertices).foreach(v => assert(g.labels(v) == h.labels(v)))
  }

  test("hyperedge-nodes get interned signature labels") {
    val interner = new LabelInterner(3)
    val g = BipartiteGraph.fromHypergraph(h, interner)
    // e1 and e2 share a signature, hence a label; e1 and e3 do not
    assert(g.labels(g.hyperedgeNode(0)) == g.labels(g.hyperedgeNode(1)))
    assert(g.labels(g.hyperedgeNode(0)) != g.labels(g.hyperedgeNode(2)))
    assert(g.labels(g.hyperedgeNode(0)) >= 3) // above the vertex-label space
  }

  test("interner is stable across query and data conversion") {
    val interner = new LabelInterner(3)
    val dg = BipartiteGraph.fromHypergraph(h, interner)
    val qg = BipartiteGraph.fromHypergraph(Hypergraph.fig1Query, interner)
    // query edge {u2,u4} has sig {A,B}, same label as data e1's node
    assert(qg.labels(qg.hyperedgeNode(0)) == dg.labels(dg.hyperedgeNode(0)))
  }

  test("adjacency is bipartite: vertex-nodes only touch hyperedge-nodes") {
    val g = BipartiteGraph.fromHypergraph(h, new LabelInterner(3))
    (0 until h.numVertices).foreach { v =>
      g.adj(v).foreach(n => assert(g.hyperedgeOfNode(n) >= 0))
    }
    h.edges.indices.foreach { e =>
      g.adj(g.hyperedgeNode(e)).foreach(n => assert(g.hyperedgeOfNode(n) == -1))
    }
  }

  test("hyperedge-node degree equals arity") {
    val g = BipartiteGraph.fromHypergraph(h, new LabelInterner(3))
    (0 until h.numEdges).foreach(e => assert(g.degree(g.hyperedgeNode(e)) == h.arity(e)))
  }

  test("hyperedgeOfNode inverts hyperedgeNode") {
    val g = BipartiteGraph.fromHypergraph(h, new LabelInterner(3))
    (0 until h.numEdges).foreach(e => assert(g.hyperedgeOfNode(g.hyperedgeNode(e)) == e))
  }
}
