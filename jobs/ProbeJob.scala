package repro.jobs

import repro.data.Datasets

/** Diagnostic: prints the signature-partition size distribution of a
  * dataset — used to pick heavy-workload parameters for Exp-4/5/6.
  * Args: [dataset=AR]
  */
object ProbeJob {
  def main(args: Array[String]): Unit = {
    val name = args.headOption.getOrElse("AR")
    val t = Datasets.tables(name)
    val sizes = t.partitions.values.map(p => (p.signature.arity, p.edgeIds.length)).toSeq
    println(s"$name: ${t.partitions.size} partitions")
    println("top 15 partitions by size (arity, edges):")
    sizes.sortBy(-_._2).take(15).foreach { case (a, n) => println(s"  arity=$a edges=$n") }
    val byArity = sizes.groupBy(_._1).view.mapValues(_.map(_._2).sum).toSeq.sorted
    println("edges by arity (first 12): " + byArity.take(12).mkString(" "))
  }
}
