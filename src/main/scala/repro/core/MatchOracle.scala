package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Compiles subhypergraph matching to SQL so DuckDB (via [[repro.Oracle]])
  * can recount embeddings independently of every engine in this repo.
  *
  * Encoding: `verts(vid, label)` and `edges(eid, sig, vset)` where `vset`
  * is the comma-joined numerically-sorted vertex-id list. A query with
  * vertices u₀…u_k and hyperedges e₀…e_n becomes one variable per query
  * vertex plus, per query hyperedge, the constraint that the mapped,
  * canonically sorted vertex set is exactly some data hyperedge with the
  * right signature. `COUNT(DISTINCT hyperedge-id tuple)` matches HGMatch's
  * match-by-hyperedge counting semantics (see DESIGN.md).
  *
  * Cross joins over per-label vertex pools: keep oracle inputs small
  * (tens of vertices) — this is a correctness check, not a benchmark.
  */
object MatchOracle {

  /** `verts` side table for [[repro.Oracle.assertEquivalent]]. */
  def vertsDf(spark: SparkSession, h: Hypergraph): DataFrame = {
    import spark.implicits._
    (0 until h.numVertices).map(v => (v.toLong, h.labels(v))).toDF("vid", "label")
  }

  /** `edges` side table: eid, signature key, canonical vertex-set string. */
  def edgesDf(spark: SparkSession, h: Hypergraph): DataFrame = {
    import spark.implicits._
    (0 until h.numEdges)
      .map(e => (e.toLong, h.signature(e).key, h.edges(e).sorted.mkString(",")))
      .toDF("eid", "sig", "vset")
  }

  /** SQL returning one row `(embeddings BIGINT)` — the number of distinct
    * hyperedge-tuple embeddings of `query`.
    */
  def countSql(query: Hypergraph): String = {
    val nv = query.numVertices
    val ne = query.numEdges
    val from =
      ((0 until nv).map(i => s"verts v$i") ++ (0 until ne).map(j => s"edges e$j")).mkString(", ")
    val labelPreds = (0 until nv).map(i => s"v$i.label = '${query.labels(i)}'")
    val distinctPreds =
      for { i <- 0 until nv; j <- i + 1 until nv } yield s"v$i.vid <> v$j.vid"
    val edgePreds = (0 until ne).flatMap { j =>
      val members = query.edges(j).map(u => s"CAST(v$u.vid AS BIGINT)").mkString(", ")
      Seq(
        s"e$j.sig = '${query.signature(j).key}'",
        s"e$j.vset = array_to_string(list_sort([$members]), ',')",
      )
    }
    val where = (labelPreds ++ distinctPreds ++ edgePreds).mkString("\n    AND ")
    val tupleCols = (0 until ne).map(j => s"e$j.eid AS t$j").mkString(", ")
    s"""SELECT CAST(count(*) AS BIGINT) AS embeddings FROM (
       |  SELECT DISTINCT $tupleCols
       |  FROM $from
       |  WHERE $where
       |) sub""".stripMargin
  }
}
