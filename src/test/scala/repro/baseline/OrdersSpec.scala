package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.core.Hypergraph

class OrdersSpec extends AnyFunSuite {

  private val q = Hypergraph.fig1Query
  private val sizes = Array(3, 1, 4, 2, 5) // synthetic candidate sizes

  test("all orders are permutations of V(q)") {
    for (o <- Seq(Orders.ceci(q, sizes), Orders.daf(q, sizes), Orders.cfl(q, sizes))) {
      assert(o.sorted.toSeq == (0 until q.numVertices))
    }
  }

  test("CECI starts at the min-candidate vertex and proceeds BFS") {
    val o = Orders.ceci(q, sizes)
    assert(o(0) == 1) // candSize 1
    // every later vertex is adjacent to an earlier one (connected query)
    for (i <- 1 until o.length)
      assert(o.take(i).exists(prev => q.adjacentVertices(prev).contains(o(i))))
  }

  test("DAF order is connected and min-candidate greedy") {
    val o = Orders.daf(q, sizes)
    assert(o(0) == 1)
    for (i <- 1 until o.length)
      assert(o.take(i).exists(prev => q.adjacentVertices(prev).contains(o(i))))
  }

  test("CFL order starts at a max-degree vertex") {
    val o = Orders.cfl(q, sizes)
    val maxDeg = (0 until q.numVertices).map(q.degree).max
    assert(q.degree(o(0)) == maxDeg)
  }

  test("orders are connected on random queries") {
    for (seed <- 1 to 15) {
      val data = TestGraphs.random(20, 25, 2, 4, seed)
      TestGraphs.sampleQuery(data, 3, seed * 9).foreach { query =>
        val cs = Array.fill(query.numVertices)(1)
        for (o <- Seq(Orders.ceci(query, cs), Orders.daf(query, cs), Orders.cfl(query, cs))) {
          assert(o.sorted.toSeq == (0 until query.numVertices))
          for (i <- 1 until o.length)
            assert(o.take(i).exists(prev => query.adjacentVertices(prev).contains(o(i))),
              s"seed=$seed order=${o.toSeq}")
        }
      }
    }
  }

  test("orders are deterministic") {
    assert(Orders.ceci(q, sizes).toSeq == Orders.ceci(q, sizes).toSeq)
    assert(Orders.daf(q, sizes).toSeq == Orders.daf(q, sizes).toSeq)
    assert(Orders.cfl(q, sizes).toSeq == Orders.cfl(q, sizes).toSeq)
  }
}
