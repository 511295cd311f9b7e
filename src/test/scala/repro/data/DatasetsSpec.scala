package repro.data

import org.scalatest.funsuite.AnyFunSuite

class DatasetsSpec extends AnyFunSuite {

  test("all ten Table II analogues are configured") {
    assert(Datasets.names == Seq("HC", "MA", "CH", "CP", "SB", "HB", "WT", "TC", "SA", "AR"))
  }

  test("single-thread set excludes AR (paper: AR is parallel-only)") {
    assert(Datasets.singleThreadNames == Datasets.names.filterNot(_ == "AR"))
  }

  test("unknown dataset name raises") {
    assertThrows[NoSuchElementException] { Datasets.config("XX") }
  }

  test("small datasets generate at (near) full size") {
    val hc = Datasets.graph("HC")
    assert(hc.numVertices == 1290)
    assert(hc.numEdges >= 250)
  }

  test("relative |V|/|E| shapes match the originals") {
    // vertex-heavy: MA, SA; edge-heavy: CH, CP, SB, HB
    assert(Datasets.graph("MA").numVertices > Datasets.graph("MA").numEdges)
    assert(Datasets.graph("SA").numVertices > Datasets.graph("SA").numEdges)
    assert(Datasets.graph("CH").numEdges > Datasets.graph("CH").numVertices)
    assert(Datasets.graph("SB").numEdges > Datasets.graph("SB").numVertices)
  }

  test("arity shapes: CH/CP low, HC/HB/SA high") {
    assert(Datasets.graph("CH").avgArity < 4)
    assert(Datasets.graph("CP").avgArity < 4)
    assert(Datasets.graph("HC").avgArity > 10)
    assert(Datasets.graph("HB").avgArity > 8)
  }

  test("label counts ordered like the originals") {
    assert(Datasets.graph("HC").numLabels == 2)
    assert(Datasets.graph("SB").numLabels == 2)
    assert(Datasets.graph("HB").numLabels == 2)
    assert(Datasets.graph("SA").numLabels > Datasets.graph("AR").numLabels)
  }

  test("graphs and tables are cached") {
    assert(Datasets.graph("CH") eq Datasets.graph("CH"))
    assert(Datasets.tables("CH") eq Datasets.tables("CH"))
  }

  test("stats rows are self-consistent") {
    val s = Datasets.stats("WT")
    val g = Datasets.graph("WT")
    assert(s.numVertices == g.numVertices)
    assert(s.numEdges == g.numEdges)
    assert(s.indexBytes > 0 && s.storageBytes > 0)
  }

  test("every dataset builds its hyperedge tables") {
    Datasets.names.foreach { n =>
      val t = Datasets.tables(n)
      assert(t.partitions.nonEmpty, n)
    }
  }
}
