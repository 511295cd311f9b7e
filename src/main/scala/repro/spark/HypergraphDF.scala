package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Hypergraph

/** DataFrame representation of an indexed data hypergraph (Section IV on
  * Spark):
  *
  *  - `vertices(vid, label)`
  *  - `edges(eid, sig, vids, labs)` — one row per hyperedge; `sig` is the
  *    signature key, so `edges.where($"sig" === s)` is the partition scan
  *    of Section IV-B (hyperedge tables keyed by signature)
  *  - `inverted(vid, sig, eid)` — the inverted hyperedge index of IV-C in
  *    flat form; an equi-join on (vid, sig) is the posting-list fetch
  *  - `cardinalities` — driver-side Card(·) metadata for the plan generator
  */
final case class HypergraphDF(
    vertices: DataFrame,
    edges: DataFrame,
    inverted: DataFrame,
    cardinalities: Map[String, Long],
)

object HypergraphDF {

  /** Build the indexed representation from a local hypergraph (offline
    * preprocessing of Fig 3, Spark tier). Edge vertex arrays are sorted
    * ascending; label arrays are aligned with them.
    */
  def build(spark: SparkSession, h: Hypergraph): HypergraphDF = {
    import spark.implicits._

    val verts = (0 until h.numVertices).map(v => (v.toLong, h.labels(v))).toDF("vid", "label")

    val edgeRows = (0 until h.numEdges).map { e =>
      val vids = h.edges(e).map(_.toLong).toSeq
      val labs = h.edges(e).map(h.labels).toSeq
      (e.toLong, h.signature(e).key, vids, labs)
    }
    val edges = edgeRows.toDF("eid", "sig", "vids", "labs")

    val inverted = edges
      .select($"eid", $"sig", explode($"vids") as "vid")
      .select($"vid", $"sig", $"eid")

    val cards = (0 until h.numEdges)
      .groupBy(e => h.signature(e).key)
      .map { case (k, es) => k -> es.size.toLong }

    HypergraphDF(verts.cache(), edges.cache(), inverted.cache(), cards)
  }
}
