package repro.baseline

import repro.core.Hypergraph

/** Entry point for the four baselines of Section VII-A. The IHS index of
  * the data hypergraph is built once per dataset and shared across queries
  * (it is offline preprocessing, like HGMatch's hyperedge tables).
  */
object Baselines {

  sealed abstract class Algo(val name: String)
  case object CFLH extends Algo("CFL-H")
  case object DAFH extends Algo("DAF-H")
  case object CECIH extends Algo("CECI-H")
  case object RapidMatch extends Algo("RapidMatch")

  val all: Seq[Algo] = Seq(CFLH, DAFH, CECIH, RapidMatch)

  /** Run one baseline on one query. */
  def run(
      algo: Algo,
      query: Hypergraph,
      data: Hypergraph,
      dataIdx: IHSIndex,
      collectTuples: Boolean = false,
      timeoutNanos: Long = Long.MaxValue,
  ): BacktrackOutcome = algo match {
    case RapidMatch =>
      RapidMatchH.run(query, data, collectTuples, timeoutNanos)
    case _ =>
      val qIdx = new IHSIndex(query)
      val cands = IHSFilter.candidates(qIdx, dataIdx)
      val sizes = cands.map(_.length)
      val order = algo match {
        case CFLH  => Orders.cfl(query, sizes)
        case DAFH  => Orders.daf(query, sizes)
        case CECIH => Orders.ceci(query, sizes)
        case _     => throw new IllegalStateException
      }
      MatchByVertex.run(query, data, order, cands, collectTuples, timeoutNanos)
  }
}
