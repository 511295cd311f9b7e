package repro.harness

import org.scalatest.funsuite.AnyFunSuite
import repro.data.{Datasets, QuerySetting}

/** Smoke tests for the experiment harness at tiny scale: every table /
  * experiment function must produce well-formed rows on the small datasets
  * (the bench project runs the full-scale versions).
  */
class ExperimentsSpec extends AnyFunSuite {

  private val small = Seq("CH", "CP")

  test("Table II rows render for all datasets in the registry") {
    val rows = Experiments.tableII(small)
    assert(rows.length == small.length + 1)
    assert(rows.head.contains("Dataset"))
    small.foreach(n => assert(rows.exists(_.startsWith(n))))
  }

  test("Table III setting rows are the paper's four") {
    val rows = Experiments.tableIII()
    assert(rows.length == 5)
    assert(rows(1).startsWith("q2"))
    assert(rows(4).startsWith("q6"))
  }

  test("Table III sampled rows render") {
    val rows = Experiments.tableIIISampled(Seq("CH"), count = 2)
    assert(rows.length == 1 + QuerySetting.all.length)
  }

  test("Exp-1 rows include build time and sizes") {
    val rows = Experiments.exp1Index(small)
    assert(rows.length == small.length + 1)
    assert(rows.head.contains("build(ms)"))
  }

  test("comparison sweep produces per-query results and completion stats") {
    val c = Experiments.comparison(names = Seq("CH"), settings = Seq(QuerySetting.q2),
      queriesPerSetting = 1, timeoutMillis = 3000)
    assert(c.perQuery.nonEmpty)
    assert(c.completion.keys.map(_._2).toSet == Set("HGMatch", "CFL-H", "DAF-H", "CECI-H", "RapidMatch"))
    val rows = Experiments.exp2Rows(c)
    assert(rows.exists(_.startsWith("CH")))
    val t4 = Experiments.tableIVRows(c)
    assert(t4.exists(_.startsWith("HGMatch")))
  }

  test("HGMatch completes the smoke sweep (Table IV claim at small scale)") {
    val c = Experiments.comparison(names = Seq("CP"), settings = Seq(QuerySetting.q2),
      queriesPerSetting = 2, timeoutMillis = 5000)
    val (done, total) = c.completion(("CP", "HGMatch"))
    assert(done == total)
  }

  test("Exp-3 rows include the three counter columns") {
    val rows = Experiments.exp3Filtering(Seq("CH"), Seq(QuerySetting.q2), queriesPerSetting = 2)
    assert(rows.head.contains("Candidates") && rows.head.contains("Filtered"))
    assert(rows.length == 2)
  }

  test("Exp-4 scalability runs on a small dataset") {
    val rows = Experiments.exp4Scalability("CH", threadCounts = Seq(1, 2), numQueries = 1,
      setting = QuerySetting.q2)
    assert(rows.length == 2)
  }

  test("Exp-5 memory rows compare task vs BFS peaks") {
    val rows = Experiments.exp5Memory("CH", numQueries = 2, threads = 2, setting = QuerySetting.q2)
    assert(rows.length == 3)
    assert(rows.head.contains("bfs peakB"))
  }

  test("Exp-6 load-balance rows cover stealing and no-stealing") {
    val rows = Experiments.exp6LoadBalance("CH", threads = 2, setting = QuerySetting.q2)
    assert(rows.exists(_.contains("HGMatch-NOSTL")))
    assert(rows.exists(_.contains("steals=")))
  }

  test("runAll reports every algorithm once") {
    val g = Datasets.graph("CH")
    val q = repro.data.QuerySampler.sample(g, QuerySetting.q2, 1, seed = 5).head
    val m = Experiments.runAll("CH", q, timeoutMillis = 3000)
    assert(m.keySet == Set("HGMatch", "CFL-H", "DAF-H", "CECI-H", "RapidMatch"))
  }
}
