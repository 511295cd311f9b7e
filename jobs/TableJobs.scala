package repro.jobs

import repro.harness.Experiments

/** `spark-submit --class repro.jobs.TableIIDatasetsJob` — prints Table II
  * (dataset statistics of the generated analogues).
  */
object TableIIDatasetsJob {
  def main(args: Array[String]): Unit =
    Experiments.tableII().foreach(println)
}

/** Prints Table III (query settings) and the per-dataset sampler outcome. */
object TableIIIQueriesJob {
  def main(args: Array[String]): Unit = {
    Experiments.tableIII().foreach(println)
    println()
    Experiments.tableIIISampled(repro.data.Datasets.names).foreach(println)
  }
}

/** Runs the single-thread comparison sweep and prints Table IV (query
  * completion ratio) plus the Exp-2 average-time rows it derives from.
  * Args: [timeoutMillis] [queriesPerSetting].
  */
object TableIVCompletionJob {
  def main(args: Array[String]): Unit = {
    val timeout = args.headOption.map(_.toLong).getOrElse(Experiments.defaultTimeoutMillis)
    val nq = args.lift(1).map(_.toInt).getOrElse(Experiments.defaultQueriesPerSetting)
    val c = Experiments.comparison(timeoutMillis = timeout, queriesPerSetting = nq)
    println("== Exp-2: average elapsed time (ms) ==")
    Experiments.exp2Rows(c).foreach(println)
    println()
    println("== Table IV: query completion ratio ==")
    Experiments.tableIVRows(c).foreach(println)
  }
}

/** Exp-1: index build time and size (Fig 7). */
object Exp1IndexJob {
  def main(args: Array[String]): Unit =
    Experiments.exp1Index().foreach(println)
}

/** Exp-3: pruning power of candidate generation + validation (Fig 9). */
object Exp3FilteringJob {
  def main(args: Array[String]): Unit =
    Experiments.exp3Filtering().foreach(println)
}

/** Exp-4: thread scalability on the AR analogue (Fig 10). */
object Exp4ScalabilityJob {
  def main(args: Array[String]): Unit =
    Experiments.exp4Scalability().foreach(println)
}

/** Exp-5: task-scheduler vs BFS peak memory (Fig 11). */
object Exp5MemoryJob {
  def main(args: Array[String]): Unit =
    Experiments.exp5Memory().foreach(println)
}

/** Exp-6: dynamic work stealing vs static assignment (Fig 12). */
object Exp6LoadBalanceJob {
  def main(args: Array[String]): Unit =
    Experiments.exp6LoadBalance().foreach(println)
}
