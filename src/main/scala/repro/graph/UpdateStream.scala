package repro.graph

import scala.collection.mutable
import scala.util.Random

/** Deterministic LDBC-SNB-lite update stream (DESIGN.md §1 system 4).
  *
  * Generates ordered [[UpdateOp]] batches against a graph produced by
  * [[SocialGraph.generate]] with the same `sf`. Tracks live ids driver-side
  * so batches never reference dead elements. Mix (motivated by the LDBC SNB
  * update workload's insert-heavy, comment-dominated profile, plus a slice
  * of person/KNOWS churn so person-centric views also receive deltas):
  *
  *  - 35% add a Comm (+ REPLY to a live Post/Comm + HAS_CREATOR)
  *  - 15% remove a live Comm (cascades its REPLY edge; children re-root)
  *  - 20% flip a Comm/Post `lang` property (fine-grained FGN update)
  *  - 7% flip a Person `country` property
  *  - 8% add a KNOWS edge, 5% remove one
  *  - 5% add a Post, 5% remove a live Post
  */
final class UpdateStream(sf: Double, seed: Long = 7) {
  private val s = SocialGraph.sizes(sf)
  private val rnd = new Random(seed)

  private val livePosts = mutable.ArrayBuffer.range(SocialGraph.PostBase, SocialGraph.PostBase + s.posts)
  private val liveComments = mutable.ArrayBuffer.range(SocialGraph.CommBase, SocialGraph.CommBase + s.comments)
  private val livePostSet = mutable.Set.from(livePosts)
  private val liveCommentSet = mutable.Set.from(liveComments)
  private var nextVertexId = SocialGraph.CommBase + 1000000L
  private var nextEdgeId = SocialGraph.EdgeBase + 100000000L
  // KNOWS edges: the generator drops self-loops, so some initial ids are
  // dead — removal of a dead id is a harmless no-op in GraphStore
  private val knowsIds = mutable.ArrayBuffer.range(
    SocialGraph.EdgeBase + 3 * 2000000L, SocialGraph.EdgeBase + 3 * 2000000L + s.knows)
  private val knowsIdSet = mutable.Set.from(knowsIds)

  private def freshV(): Long = { nextVertexId += 1; nextVertexId }
  private def freshE(): Long = { nextEdgeId += 1; nextEdgeId }
  private def pick(buf: mutable.ArrayBuffer[Long], set: mutable.Set[Long]): Option[Long] = {
    var tries = 0
    while (tries < 20 && buf.nonEmpty) {
      val i = rnd.nextInt(buf.size)
      val id = buf(i)
      if (set.contains(id)) return Some(id)
      buf.remove(i) // lazily compact dead ids
      tries += 1
    }
    None
  }
  private def lang(): String = SocialGraph.Languages(rnd.nextInt(SocialGraph.Languages.size))
  private def person(): Long = SocialGraph.PersonBase + rnd.nextInt(s.persons.toInt.max(1))

  def addComment(): Seq[UpdateOp] = {
    val id = freshV()
    val parent =
      if (rnd.nextDouble() < 0.25 || liveComments.isEmpty)
        pick(livePosts, livePostSet).getOrElse(return Seq.empty)
      else pick(liveComments, liveCommentSet).getOrElse(return Seq.empty)
    liveComments += id; liveCommentSet += id
    Seq(
      AddVertex(id, "Comm", Map("lang" -> lang(), "day" -> rnd.nextInt(1000).toString)),
      AddEdge(freshE(), id, parent, "REPLY", Map.empty),
      AddEdge(freshE(), id, person(), "HAS_CREATOR", Map.empty),
    )
  }

  def removeComment(): Seq[UpdateOp] =
    pick(liveComments, liveCommentSet) match {
      case Some(id) => liveCommentSet -= id; Seq(RemoveVertex(id))
      case None => Seq.empty
    }

  def flipLang(): Seq[UpdateOp] = {
    val target =
      if (rnd.nextBoolean()) pick(liveComments, liveCommentSet)
      else pick(livePosts, livePostSet)
    target.map(id => SetVertexProp(id, "lang", lang())).toSeq
  }

  def addPost(): Seq[UpdateOp] = {
    val id = freshV()
    livePosts += id; livePostSet += id
    Seq(
      AddVertex(id, "Post", Map("lang" -> lang(), "day" -> rnd.nextInt(1000).toString)),
      AddEdge(freshE(), id, person(), "HAS_CREATOR", Map.empty),
    )
  }

  def removePost(): Seq[UpdateOp] =
    pick(livePosts, livePostSet) match {
      case Some(id) => livePostSet -= id; Seq(RemoveVertex(id))
      case None => Seq.empty
    }

  def flipCountry(): Seq[UpdateOp] =
    Seq(SetVertexProp(person(), "country",
      SocialGraph.Countries(rnd.nextInt(SocialGraph.Countries.size))))

  def addKnows(): Seq[UpdateOp] = {
    val (a, b) = (person(), person())
    if (a == b) Seq.empty
    else {
      val id = freshE()
      knowsIds += id; knowsIdSet += id
      Seq(AddEdge(id, a, b, "KNOWS", Map("since" -> (1990 + rnd.nextInt(35)).toString)))
    }
  }

  def removeKnows(): Seq[UpdateOp] =
    if (knowsIds.isEmpty) Seq.empty
    else {
      val i = rnd.nextInt(knowsIds.size)
      val id = knowsIds.remove(i)
      knowsIdSet -= id
      Seq(RemoveEdge(id))
    }

  /** One mixed logical operation (may expand to several [[UpdateOp]]s). */
  def nextOp(): Seq[UpdateOp] = {
    val r = rnd.nextDouble()
    if (r < 0.35) addComment()
    else if (r < 0.50) removeComment()
    else if (r < 0.70) flipLang()
    else if (r < 0.77) flipCountry()
    else if (r < 0.85) addKnows()
    else if (r < 0.90) removeKnows()
    else if (r < 0.95) addPost()
    else removePost()
  }

  /** A batch of `n` mixed logical operations. */
  def nextBatch(n: Int): Seq[UpdateOp] = (1 to n).flatMap(_ => nextOp())

  /** A batch of pure fine-grained property flips (Table 4). Returns the
    * touched ids alongside, so the coarse-grained baseline can re-express
    * the same logical change as vertex delete+reinsert.
    */
  def langFlipBatch(n: Int): Seq[SetVertexProp] =
    (1 to n).flatMap { _ =>
      pick(liveComments, liveCommentSet).map(id => SetVertexProp(id, "lang", lang()))
    }

  /** A batch of REPLY-edge churn ops (Table 5): deletes an existing comment's
    * REPLY edge and re-attaches the comment elsewhere — implemented as
    * comment removal + fresh comment insertion to keep id tracking simple.
    */
  def replyChurnBatch(n: Int): Seq[UpdateOp] =
    (1 to n).flatMap(_ => removeComment() ++ addComment())
}
