package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.{Datasets, QuerySetting}
import repro.harness.Experiments

/** Shared sweep state so Exp-2 and Table IV run the (expensive) comparison
  * once per bench invocation.
  */
object BenchSweep {
  lazy val comparison: Experiments.ComparisonResult = Experiments.comparison(
    names = Datasets.singleThreadNames,
    settings = Seq(QuerySetting.q2, QuerySetting.q3),
    queriesPerSetting = Experiments.defaultQueriesPerSetting,
    timeoutMillis = Experiments.defaultTimeoutMillis,
  )

  def banner(title: String): Unit = {
    println()
    println("=" * 72)
    println(s"== $title")
    println("=" * 72)
  }
}

/** Table II — dataset statistics of the generated analogues, printed next
  * to the paper's originals (EXPERIMENTS.md holds the diff).
  */
class TableIIDatasetsBench extends AnyFunSuite {
  test("Table II: dataset statistics") {
    BenchSweep.banner("TABLE II — datasets (synthetic analogues; paper numbers in EXPERIMENTS.md)")
    Experiments.tableII().foreach(println)
    // shape checks against the originals' ordering
    val stats = Datasets.names.map(Datasets.stats)
    val byName = stats.map(s => s.name -> s).toMap
    assert(byName("HC").numLabels == 2 && byName("SB").numLabels == 2 && byName("HB").numLabels == 2)
    assert(byName("HC").avgArity > byName("CH").avgArity) // 34.8 vs 2.3 shape
    assert(byName("AR").numEdges == stats.map(_.numEdges).max) // AR largest by |E|
    assert(byName("SA").numLabels == stats.map(_.numLabels).max) // SA most labels
  }
}

/** Table III — query settings and what the random-walk sampler actually
  * produced per dataset.
  */
class TableIIIQueriesBench extends AnyFunSuite {
  test("Table III: query settings") {
    BenchSweep.banner("TABLE III — query settings")
    Experiments.tableIII().foreach(println)
    println()
    println("-- sampler outcome per dataset --")
    Experiments.tableIIISampled(Datasets.names).foreach(println)
  }
}

/** Exp-1 (Fig 7) — index build time and size. */
class Exp1IndexBench extends AnyFunSuite {
  test("Exp-1: inverted hyperedge index build time and size") {
    BenchSweep.banner("EXP-1 (Fig 7) — index build time / graph size / index size")
    Experiments.exp1Index().foreach(println)
    // paper: ~6.7 s for 4.2M-edge AR; our AR analogue is ~115x smaller and
    // must build well under a second.
    assert(Datasets.stats("AR").buildMillis < 5000)
    // index size is the same order as the graph (Section IV-C analysis)
    Datasets.names.foreach { n =>
      val s = Datasets.stats(n)
      val ratio = s.indexBytes.toDouble / s.storageBytes
      assert(ratio > 0.2 && ratio < 5.0, s"$n ratio=$ratio")
    }
  }
}

/** Exp-2 (Fig 8) — average elapsed time per algorithm. */
class Exp2OverallBench extends AnyFunSuite {
  test("Exp-2: single-thread comparison, HGMatch vs extended baselines") {
    val c = BenchSweep.comparison
    BenchSweep.banner("EXP-2 (Fig 8) — avg elapsed ms (timeouts charged at the limit)")
    Experiments.exp2Rows(c).foreach(println)

    // Shape assertion: across all (dataset, setting) cells HGMatch's mean
    // time must beat every baseline's mean in aggregate.
    val algos = Seq("CFL-H", "DAF-H", "CECI-H", "RapidMatch")
    val cells = c.avgMillis.keys.map { case (n, s, _) => (n, s) }.toSeq.distinct
    def total(algo: String): Double = cells.flatMap(k => c.avgMillis.get((k._1, k._2, algo))).sum
    val hg = total("HGMatch")
    algos.foreach { a =>
      val t = total(a)
      println(f"aggregate: HGMatch=${hg}%.1fms $a=${t}%.1fms speedup=${t / hg}%.1fx")
      assert(hg < t, s"HGMatch slower than $a in aggregate")
    }
  }
}

/** Table IV — query completion ratio (single-thread). */
class TableIVCompletionBench extends AnyFunSuite {
  test("Table IV: query completion ratio") {
    val c = BenchSweep.comparison
    BenchSweep.banner("TABLE IV — query completion ratio (single-thread)")
    Experiments.tableIVRows(c).foreach(println)

    // Paper claim: HGMatch is the only algorithm completing 100%.
    val hg = c.completion.collect { case ((_, "HGMatch"), v) => v }
    val (done, total) = hg.foldLeft((0, 0)) { case ((d, t), (d1, t1)) => (d + d1, t + t1) }
    assert(done == total, s"HGMatch completed $done/$total")
  }
}

/** Exp-3 (Fig 9) — pruning power. */
class Exp3FilteringBench extends AnyFunSuite {
  test("Exp-3: candidates vs filtered vs embeddings") {
    BenchSweep.banner("EXP-3 (Fig 9) — candidate filtering power")
    val rows = Experiments.exp3Filtering()
    rows.foreach(println)
  }
}

/** Exp-4 (Fig 10) — scalability with threads. */
class Exp4ScalabilityBench extends AnyFunSuite {
  test("Exp-4: thread scalability on the AR analogue") {
    BenchSweep.banner("EXP-4 (Fig 10) — vary number of threads (AR analogue)")
    val rows = Experiments.exp4Scalability("AR", threadCounts = Seq(1, 2, 4, 8, 16), numQueries = 2)
    rows.foreach(println)
  }
}

/** Exp-5 (Fig 11) — bounded memory of the task scheduler. */
class Exp5MemoryBench extends AnyFunSuite {
  test("Exp-5: task-based scheduler vs BFS-style memory") {
    BenchSweep.banner("EXP-5 (Fig 11) — task scheduler vs BFS peak memory")
    val rows = Experiments.exp5Memory("AR", numQueries = 8, threads = 8)
    rows.foreach(println)
  }
}

/** Exp-6 (Fig 12) — work-stealing load balance. */
class Exp6LoadBalanceBench extends AnyFunSuite {
  test("Exp-6: dynamic work stealing vs static assignment") {
    BenchSweep.banner("EXP-6 (Fig 12) — per-worker busy time, stealing vs none")
    val rows = Experiments.exp6LoadBalance("AR", threads = 8)
    rows.foreach(println)
  }
}
