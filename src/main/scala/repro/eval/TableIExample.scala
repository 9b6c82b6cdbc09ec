package repro.eval

import org.apache.spark.sql.SparkSession
import repro.core.{Subgraph, Summarizer, UserCentric}
import repro.kg._
import repro.rec.ExplanationPath

/** The paper's running example (Table I / Fig 1): User 1 receives three
  * movie recommendations (Eternity and a Day, The Beekeeper, The Suspended
  * Step of the Stork), each with a path explanation of total length 13;
  * the ST summary connects all three through the central nodes
  * "Theo Angelopoulos" and "Drama" with ~6 edges.
  */
object TableIExample {

  // Node ids, mirroring the entities of the example.
  val User1: Long  = NodeIds.user(1)
  val User2: Long  = NodeIds.user(2)
  val LandscapeInTheMist: Long       = NodeIds.item(1)
  val TravellingPlayers: Long        = NodeIds.item(2)
  val EternityAndADay: Long          = NodeIds.item(3) // Item A
  val UlyssesGaze: Long              = NodeIds.item(4)
  val TheBeekeeper: Long             = NodeIds.item(5) // Item B
  val WeepingMeadow: Long            = NodeIds.item(6)
  val DustOfTime: Long               = NodeIds.item(7)
  val SuspendedStepOfTheStork: Long  = NodeIds.item(8) // Item C
  val TheoAngelopoulos: Long = NodeIds.external(1)
  val Drama: Long            = NodeIds.external(2)

  val names: Map[Long, String] = Map(
    User1 -> "User 1", User2 -> "User 2",
    LandscapeInTheMist -> "Landscape in the Mist", TravellingPlayers -> "The Travelling Players",
    EternityAndADay -> "Eternity and a Day", UlyssesGaze -> "Ulysses' Gaze",
    TheBeekeeper -> "The Beekeeper", WeepingMeadow -> "The Weeping Meadow",
    DustOfTime -> "The Dust of Time", SuspendedStepOfTheStork -> "The Suspended Step of the Stork",
    TheoAngelopoulos -> "Theo Angelopoulos", Drama -> "Drama")

  /** The three explanation paths of Table I (total length 5 + 3 + 5 = 13). */
  def paths: Seq[ExplanationPath] = Seq(
    ExplanationPath(User1, EternityAndADay, 1,
      Vector(User1, LandscapeInTheMist, User2, TravellingPlayers, Drama, EternityAndADay)),
    ExplanationPath(User1, TheBeekeeper, 2,
      Vector(User1, UlyssesGaze, TheoAngelopoulos, TheBeekeeper)),
    ExplanationPath(User1, SuspendedStepOfTheStork, 3,
      Vector(User1, WeepingMeadow, TheoAngelopoulos, DustOfTime, Drama, SuspendedStepOfTheStork)),
  )

  /** The knowledge graph of Fig 1 via the standard builder: ratings for
    * the user-item edges, DBpedia-style links for item-external edges.
    */
  def knowledgeGraph(spark: SparkSession): KGraph = {
    import spark.implicits._
    val users = Seq((1L, "F"), (2L, "M")).toDF("user_id", "gender")
    val t = 1_000_000_000L
    val ratings = Seq(
      (1L, 1L, 5.0, t), // User 1 rated Landscape in the Mist
      (1L, 4L, 5.0, t), // User 1 rated Ulysses' Gaze
      (1L, 6L, 4.0, t), // User 1 rated The Weeping Meadow
      (2L, 1L, 4.0, t), // User 2 rated Landscape in the Mist
      (2L, 2L, 5.0, t), // User 2 rated The Travelling Players
    ).toDF("user_id", "item_id", "rating", "ts")
    val itemExt = Seq(
      // directed by Theo Angelopoulos (all eight films of the example)
      (1L, 1L), (2L, 1L), (3L, 1L), (4L, 1L), (5L, 1L), (6L, 1L), (7L, 1L), (8L, 1L),
      // Drama genre
      (2L, 2L), (3L, 2L), (7L, 2L), (8L, 2L),
    ).toDF("item_id", "ext_id")
    val userExt = Seq.empty[(Long, Long)].toDF("user_id", "ext_id")
    KGBuilder.build(spark, DatasetTables(users, ratings, itemExt, userExt))
  }

  /** The ST summary of the example (λ = 1, as the moderate setting). */
  def summary(spark: SparkSession, lambda: Double = 1.0): Subgraph = {
    val kg = knowledgeGraph(spark)
    val kgIdx = KgIndex.fromKGraph(kg)
    Summarizer.summarize(kgIdx, UserCentric(User1, paths), Summarizer.ST(lambda)).subgraph
  }

  def render(s: Subgraph): String = {
    val lines = s.edges.map(e => s"  ${names.getOrElse(e.src, e.src.toString)} -> " +
      s"${names.getOrElse(e.dst, e.dst.toString)}  (w_M=${e.wM})")
    s"Summary V_S (${s.nodes.length} nodes, ${s.edges.length} edges):\n" + lines.mkString("\n")
  }
}
