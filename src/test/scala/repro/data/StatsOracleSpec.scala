package repro.data

import repro.{Oracle, SparkSpec}
import repro.core.MatchOracle

/** Table II statistics cross-checked through DuckDB: the per-dataset stats
  * the bench reports (|V|, |E|, ā) are recomputed by SQL over the
  * incidence relation of the generated hypergraph.
  */
class StatsOracleSpec extends SparkSpec {

  for (name <- Seq("CH", "SB", "WT")) {
    test(s"$name: |E| and average arity match a DuckDB recount") {
      import spark.implicits._
      val g = Datasets.graph(name)
      val edges = MatchOracle.edgesDf(spark, g)
      val stats = Seq((g.numEdges.toLong, BigDecimal(g.avgArity).setScale(3, BigDecimal.RoundingMode.HALF_UP).toDouble))
        .toDF("num_edges", "avg_arity")
      Oracle.assertEquivalent(
        stats,
        """SELECT CAST(count(*) AS BIGINT) AS num_edges,
          |       round(avg(CAST(len(string_split(vset, ',')) AS DOUBLE)), 3) AS avg_arity
          |FROM edges""".stripMargin,
        "edges" -> edges,
      )
    }

    test(s"$name: |V| matches a DuckDB recount of the vertex table") {
      import spark.implicits._
      val g = Datasets.graph(name)
      Oracle.assertEquivalent(
        Seq(g.numVertices.toLong).toDF("num_vertices"),
        "SELECT CAST(count(*) AS BIGINT) AS num_vertices FROM verts",
        "verts" -> MatchOracle.vertsDf(spark, g),
      )
    }

    test(s"$name: signature partition cardinalities match DuckDB group-by") {
      import spark.implicits._
      val g = Datasets.graph(name)
      val t = Datasets.tables(name)
      val sparkSide = t.partitions.toSeq
        .map { case (sig, p) => (sig.key, p.edgeIds.length.toLong) }
        .toDF("sig", "card")
      Oracle.assertEquivalent(
        sparkSide,
        "SELECT sig, CAST(count(*) AS BIGINT) AS card FROM edges GROUP BY sig",
        "edges" -> MatchOracle.edgesDf(spark, g),
      )
    }
  }
}
