package repro.data

import scala.collection.mutable
import scala.util.Random
import repro.core.Hypergraph

/** Synthetic stand-in for the JF17K hypergraph knowledge base of the case
  * study (Section VII-D): vertices are typed entities, hyperedges are
  * n-ary facts. Two fact shapes from the paper are modelled —
  * (Player, Team, Match) and (Actor, Character, TVShow, Season) — with a
  * known number of planted answers for the two Fig-13 questions.
  */
object KnowledgeBase {

  /** Label ids. */
  val Player = 0; val Team = 1; val Match_ = 2
  val Actor = 3; val Character = 4; val TVShow = 5; val Season = 6
  val labelNames: IndexedSeq[String] =
    IndexedSeq("Player", "Team", "Match", "Actor", "Character", "TVShow", "Season")

  /** Generated KB plus ground-truth counts of planted answers. */
  final case class KB(graph: Hypergraph, plantedQuery1: Int, plantedQuery2: Int)

  /** Build a KB with `nPlayers` players (of whom `multiTeam` played for two
    * teams in two different matches — the Query-1 answers) and `nActors`
    * actor facts (of which `recastPairs` character/show pairs were played by
    * two actors in different seasons — the Query-2 answers).
    *
    * Non-answer facts use one team (resp. one actor/season) per entity, so
    * the planted counts are exact ground truth.
    */
  def generate(
      nPlayers: Int = 120,
      multiTeam: Int = 25,
      nActors: Int = 80,
      recastPairs: Int = 12,
      seed: Long = 7L,
  ): KB = {
    val rnd = new Random(seed)
    val labels = mutable.ArrayBuffer.empty[Int]
    val edges = mutable.ArrayBuffer.empty[Seq[Int]]
    def vertex(label: Int): Int = { labels += label; labels.size - 1 }

    // Sports facts. Answer players get two (player, team_i, match_i) facts
    // with distinct teams and matches; background players get one fact.
    for (i <- 0 until nPlayers) {
      val p = vertex(Player)
      if (i < multiTeam) {
        val t1 = vertex(Team); val t2 = vertex(Team)
        val m1 = vertex(Match_); val m2 = vertex(Match_)
        edges += Seq(p, t1, m1)
        edges += Seq(p, t2, m2)
      } else {
        val t = vertex(Team); val m = vertex(Match_)
        edges += Seq(p, t, m)
        // Some background players appear twice for the SAME team -- not an
        // answer to Query 1 (teams must differ), exercises validation.
        if (rnd.nextDouble() < 0.3) edges += Seq(p, t, vertex(Match_))
      }
    }

    // TV facts. Answer pairs: same character+show, two actors, two seasons.
    for (i <- 0 until nActors) {
      val c = vertex(Character); val s = vertex(TVShow)
      if (i < recastPairs) {
        val a1 = vertex(Actor); val a2 = vertex(Actor)
        val se1 = vertex(Season); val se2 = vertex(Season)
        edges += Seq(a1, c, s, se1)
        edges += Seq(a2, c, s, se2)
      } else {
        val a = vertex(Actor)
        edges += Seq(a, c, s, vertex(Season))
      }
    }

    KB(Hypergraph(labels.toSeq, edges.toSeq, Some(labelNames)), multiTeam, recastPairs)
  }

  /** Query 1 (Fig 13a): "Football players who represented different teams
    * in different matches" — two (Player,Team,Match) facts sharing the
    * player; injectivity forces the teams and matches to differ.
    */
  def query1: Hypergraph = Hypergraph(
    labels = Seq(Player, Team, Team, Match_, Match_),
    rawEdges = Seq(Seq(0, 1, 3), Seq(0, 2, 4)),
    labelNames = Some(labelNames),
  )

  /** Query 2 (Fig 13b): "Actors who played the same character in a TV show
    * on different seasons" — two (Actor,Character,TVShow,Season) facts
    * sharing character and show, with distinct actors and seasons.
    */
  def query2: Hypergraph = Hypergraph(
    labels = Seq(Actor, Actor, Character, TVShow, Season, Season),
    rawEdges = Seq(Seq(0, 2, 3, 4), Seq(1, 2, 3, 5)),
    labelNames = Some(labelNames),
  )
}
