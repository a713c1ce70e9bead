package repro.graph

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** LDBC-SNB-lite synthetic property graph (the paper motivates with LDBC SNB
  * [17]; the real dataset is not available offline, see DESIGN.md §1
  * "Substitutions").
  *
  * Elements (deterministic in (sf, seed)):
  *  - `Person(name, country)` vertices
  *  - `Post(lang, day)` vertices
  *  - `Comm(lang, day)` vertices — each Comm REPLYs to a Post or an earlier
  *    Comm, forming reply forests whose depth grows like log(#comments)
  *    (uniform ancestor attachment), which exercises the `REPLY*` closure.
  *  - `REPLY(Comm → Post|Comm)`, `HAS_CREATOR(Post|Comm → Person)`,
  *    `KNOWS(Person → Person)`, `LIKES(Person → Post)` edges.
  *
  * Id spaces are disjoint: persons start at 1e6, posts at 2e6, comments at
  * 3e6; edges at 1e7. This makes driver-side update generation simple.
  *
  * At SF=1: 50k persons, 100k posts, 400k comments, ~1.2M edges. Tests use
  * SF=0.01, benches SF up to 0.1.
  */
object SocialGraph {

  val PersonBase = 1000000L
  val PostBase = 2000000L
  val CommBase = 3000000L
  val EdgeBase = 10000000L

  val Languages: Seq[String] =
    Seq("en", "de", "fr", "es", "pt", "ru", "zh", "ja", "hu", "nl")
  val Countries: Seq[String] =
    Seq("US", "DE", "FR", "ES", "BR", "RU", "CN", "JP", "HU", "NL", "GB", "IN")

  final case class Sizes(persons: Long, posts: Long, comments: Long, knows: Long, likes: Long)

  def sizes(sf: Double): Sizes = {
    def n(base: Long): Long = math.max(2L, (base * sf).toLong)
    Sizes(n(50000), n(100000), n(400000), n(100000), n(200000))
  }

  /** Zipf-ish pick from a small domain: index = floor(u^2 * n). */
  private def skewedPick(u: Column, domain: Seq[String]): Column =
    element_at(
      array(domain.map(lit): _*),
      (pow(u, 2.0) * domain.size + 1).cast(IntegerType))

  def generate(spark: SparkSession, sf: Double, seed: Long = 42): PropertyGraph = {
    val s = sizes(sf)

    val persons = spark.range(0, s.persons).select(
      (col("id") + PersonBase) as "id",
      lit("Person") as "label",
      concat(lit("person"), col("id")) as "name",
      skewedPick(rand(seed + 1), Countries) as "country",
    )
    val posts = spark.range(0, s.posts).select(
      (col("id") + PostBase) as "id",
      lit("Post") as "label",
      skewedPick(rand(seed + 2), Languages) as "lang",
      (rand(seed + 3) * 1000).cast(IntegerType).cast(StringType) as "day",
      (rand(seed + 4) * s.persons).cast(LongType) + PersonBase as "creator",
    )
    // Comment i replies to a post with prob 0.25, else to a uniformly chosen
    // earlier comment j < i (uniform attachment → depth ~ H(n) ≈ ln n).
    // Its language matches the root post's region of the lang distribution
    // often enough for the running-example predicate to be selective but
    // non-empty.
    val comments = spark.range(0, s.comments).select(
      (col("id") + CommBase) as "id",
      lit("Comm") as "label",
      skewedPick(rand(seed + 5), Languages) as "lang",
      (rand(seed + 6) * 1000).cast(IntegerType).cast(StringType) as "day",
      (rand(seed + 7) * s.persons).cast(LongType) + PersonBase as "creator",
      when(rand(seed + 8) < 0.25 || col("id") === 0,
        (rand(seed + 9) * s.posts).cast(LongType) + PostBase)
        .otherwise((rand(seed + 10) * col("id")).cast(LongType) + CommBase) as "parent",
    )

    val vertices =
      persons.select("id", "label")
        .unionByName(posts.select("id", "label"))
        .unionByName(comments.select("id", "label"))

    def props(df: DataFrame, keys: Seq[String]): DataFrame =
      df.select(col("id"),
        explode(map(keys.flatMap(k => Seq(lit(k), col(k))): _*)) as Seq("key", "value"))
    val vprops =
      props(persons, Seq("name", "country"))
        .unionByName(props(posts, Seq("lang", "day")))
        .unionByName(props(comments, Seq("lang", "day")))

    // Edge id blocks: REPLY, HAS_CREATOR(post), HAS_CREATOR(comm), KNOWS, LIKES.
    val B = 2000000L
    val reply = comments.select(
      (col("id") - CommBase + EdgeBase) as "id",
      col("id") as "src", col("parent") as "dst", lit("REPLY") as "typ")
    val hcPost = posts.select(
      (col("id") - PostBase + EdgeBase + B) as "id",
      col("id") as "src", col("creator") as "dst", lit("HAS_CREATOR") as "typ")
    val hcComm = comments.select(
      (col("id") - CommBase + EdgeBase + 2 * B) as "id",
      col("id") as "src", col("creator") as "dst", lit("HAS_CREATOR") as "typ")
    val knows = spark.range(0, s.knows).select(
      (col("id") + EdgeBase + 3 * B) as "id",
      (rand(seed + 11) * s.persons).cast(LongType) + PersonBase as "src",
      (rand(seed + 12) * s.persons).cast(LongType) + PersonBase as "dst",
      lit("KNOWS") as "typ",
    ).filter(col("src") =!= col("dst"))
    val likes = spark.range(0, s.likes).select(
      (col("id") + EdgeBase + 4 * B) as "id",
      (rand(seed + 13) * s.persons).cast(LongType) + PersonBase as "src",
      (rand(seed + 14) * s.posts).cast(LongType) + PostBase as "dst",
      lit("LIKES") as "typ",
    )
    val edges = reply.unionByName(hcPost).unionByName(hcComm)
      .unionByName(knows).unionByName(likes)

    PropertyGraph(vertices, vprops, edges, PropertyGraph.emptyProps(spark))
  }
}
