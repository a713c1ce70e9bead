package repro.ivm

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.eval.FraEval
import repro.fra.FTransitiveEdges
import repro.graph.PropertyGraph

/** Incremental transitive closure with materialised *atomic paths*
  * (paper §4 and DESIGN.md §2.3; incremental transitive operators per refs
  * [3, 23]).
  *
  * Internal state `T`: every trail (openCypher semantics — no repeated
  * edge) of 1..maxHops `typ`-edges starting at a `srcLabel` vertex, as rows
  * `(src, dst, <path>__vs, <path>__es)` with multiplicity 1 (trails are
  * identified by their edge array, so the state is a set). Trails shorter
  * than `minHops` are kept internally — they serve as prefixes during
  * maintenance — and filtered out of the exposed state.
  *
  * Maintenance under a batch (Δ⁻ edges `delE`, Δ⁺ edges `insE`, source-set
  * changes `remSrcs`/`addSrcs`):
  *
  *  - **deletions**: every state trail whose edge array meets `delE`, or
  *    whose source left the source set, is deleted *as a whole* — paths are
  *    atomic (ORD).
  *  - **part B**: trails from the new sources over surviving old edges
  *    (plain BFS — disjoint from everything else because those sources had
  *    no trails before).
  *  - **part A**: trails using ≥1 inserted edge, enumerated exactly once via
  *    the *last-inserted-edge decomposition* `trail = prefix · e · suffix`
  *    where `e ∈ insE`, the suffix uses only surviving old edges, and the
  *    prefix is ε or any already-known post-state trail ending at `e.from`
  *    (computed to fixpoint because prefixes may themselves contain inserted
  *    edges). Trail-ness of each concatenation is enforced explicitly.
  */
final class TransitiveNode(val leaf: FTransitiveEdges) extends StatefulNode {

  private val vsCol = s"${leaf.pathName}__vs"
  private val esCol = s"${leaf.pathName}__es"

  /** Internal trail state including lengths below minHops. */
  private var trailsAll: DataFrame = _
  private var trailsAllPrev: DataFrame = _
  private var tfolds = 0
  /** Current valid source vertices (single column = leaf.src). */
  private var srcs: DataFrame = _

  override def schema: Seq[String] = Seq(leaf.src, leaf.dst, vsCol, esCol)
  override def children: Seq[IvmNode] = Seq.empty

  private def exposed(t: DataFrame): DataFrame = t.filter(FraEval.hopFilter(leaf))

  override def init(g: PropertyGraph): Unit = {
    srcs = Rel.materialize(
      g.vertices
        .filter(leaf.srcLabel.map(col("label") === _).getOrElse(lit(true)))
        .select(col("id").as(leaf.src)))
    trailsAll = Rel.materialize(Rel.normalize(Rel.withCount(
      FraEval.trails(leaf, srcs, FraEval.orientedEdges(g, leaf.typ, leaf.reversed)))))
    trailsAllPrev = trailsAll.limit(0)
    setInitialFromTrails()
  }

  private def setInitialFromTrails(): Unit = {
    cur = exposed(trailsAll)
    prevDf = cur.limit(0)
  }

  override def apply(ctx: DeltaCtx): DataFrame = {
    // discrimination precheck (no Spark jobs): only changes to this
    // closure's edge type or its source label can move paths
    val relevant = ctx.delta.stats.forall(s =>
      s.touchesEdgeType(leaf.typ) || s.touchesVertexLabel(leaf.srcLabel))
    if (!relevant) {
      trailsAllPrev = trailsAll
      prevDf = cur
      lastDeltaEmpty = true
      return cur.limit(0)
    }
    val spark = ctx.after.vertices.sparkSession
    import spark.implicits._

    def labelFilter(df: DataFrame): DataFrame =
      df.filter(leaf.srcLabel.map(col("label") === _).getOrElse(lit(true)))

    // --- source-set and edge deltas (batch-sized; read driver-side when the
    // store provided rows, so no collect round-trips); only label-matching
    // vertices can be sources
    def matchesLabel(l: String): Boolean = leaf.srcLabel.forall(_ == l)
    def matchesTyp(t: String): Boolean = leaf.typ.forall(_ == t)
    def orientRow(e: (Long, Long, Long, String)): (Long, Long, Long) =
      if (!leaf.reversed) (e._2, e._3, e._1) else (e._3, e._2, e._1) // (__from, __to, __eid)

    val (remSrcIds, addSrcIds, insERows, delEIds) = ctx.delta.rows match {
      case Some(r) =>
        (r.delV.collect { case (id, l) if matchesLabel(l) => id },
          r.insV.collect { case (id, l) if matchesLabel(l) => id },
          r.insE.collect { case e if matchesTyp(e._4) => orientRow(e) },
          r.delE.collect { case e if matchesTyp(e._4) => e._1 })
      case None =>
        def orient(df: DataFrame): DataFrame = {
          val e = df.filter(leaf.typ.map(col("typ") === _).getOrElse(lit(true)))
          if (!leaf.reversed)
            e.select(col("src").as("__from"), col("dst").as("__to"), col("id").as("__eid"))
          else e.select(col("dst").as("__from"), col("src").as("__to"), col("id").as("__eid"))
        }
        (labelFilter(ctx.delta.delVertices).select("id").as[Long].collect().toSeq,
          labelFilter(ctx.delta.insVertices).select("id").as[Long].collect().toSeq,
          orient(ctx.delta.insEdges).collect().map(r => (r.getLong(0), r.getLong(1), r.getLong(2))).toSeq,
          orient(ctx.delta.delEdges).select("__eid").as[Long].collect().toSeq)
    }
    val insEIds: Seq[Long] = insERows.map(_._3)
    // driver-local frame: no materialisation needed
    val insE = insERows.toDF("__from", "__to", "__eid")

    // fast path: the batch touches nothing this closure depends on (e.g.
    // pure property updates) — path state is untouched by construction
    if (remSrcIds.isEmpty && addSrcIds.isEmpty && delEIds.isEmpty && insEIds.isEmpty) {
      trailsAllPrev = trailsAll
      prevDf = cur
      lastDeltaEmpty = true
      return cur.limit(0)
    }

    // --- update the source set (skip entirely when it cannot have changed)
    val srcsAfter =
      if (remSrcIds.isEmpty && addSrcIds.isEmpty) srcs
      else Rel.materialize(
        srcs.filter(if (remSrcIds.isEmpty) lit(true) else !col(leaf.src).isin(remSrcIds: _*))
          .unionByName(if (addSrcIds.isEmpty) srcs.limit(0)
                       else addSrcIds.toDF(leaf.src))
          .distinct())

    // --- deletions: atomic paths die whole (pure-insert batches skip both scans)
    val (removed, surviving) =
      if (delEIds.isEmpty && remSrcIds.isEmpty) (trailsAll.limit(0), trailsAll)
      else {
        val deadCond =
          (if (delEIds.isEmpty) lit(false)
           else arrays_overlap(col(esCol), typedLit(delEIds))) ||
          (if (remSrcIds.isEmpty) lit(false) else col(leaf.src).isin(remSrcIds: _*))
        (Rel.materialize(trailsAll.filter(deadCond)),
          Rel.materialize(trailsAll.filter(!deadCond)))
      }

    // --- surviving old edges of the after-snapshot
    val oldE = Rel.materialize(
      FraEval.orientedEdges(ctx.after, leaf.typ, leaf.reversed)
        .filter(if (insEIds.isEmpty) lit(true) else !col("__eid").isin(insEIds: _*)))

    // --- part B: trails from newly valid sources over old edges only
    val partB =
      if (addSrcIds.isEmpty) surviving.limit(0)
      else Rel.withCount(FraEval.trails(leaf, addSrcIds.toDF(leaf.src), oldE))

    // --- part A: trails containing >=1 inserted edge
    val partA =
      if (insEIds.isEmpty) surviving.limit(0)
      else {
        // suffixes over old edges, starting at inserted-edge targets; ε is
        // handled by the null-tolerant assembly below
        val sfxLeaf = leaf.copy(minHops = 1, maxHops = leaf.maxHops - 1, pathName = "__sfx")
        val sfx =
          if (leaf.maxHops <= 1) null
          else FraEval.trails(sfxLeaf, insE.select(col("__to").as(leaf.src)).distinct(), oldE)
            .select(col(leaf.src).as("__sfrom"), col(leaf.dst).as("__sto"),
              col("__sfx__vs").as("__svs"), col("__sfx__es").as("__ses"))
            .localCheckpoint(true)

        // e · (ε | suffix): candidate tails starting with an inserted edge
        val eAlone = insE.select(
          col("__from"), col("__to").as("__tdst"),
          array(col("__from"), col("__to")).as("__tvs"),
          array(col("__eid")).as("__tes"))
        val eWithSfx =
          if (sfx == null) eAlone.limit(0)
          else insE.join(sfx, insE("__to") === col("__sfrom"))
            .select(
              col("__from"), col("__sto").as("__tdst"),
              concat(array(col("__from")), col("__svs")).as("__tvs"),
              concat(array(col("__eid")), col("__ses")).as("__tes"))
        val tails = Rel.materialize(
          eAlone.unionByName(eWithSfx).filter(size(col("__tes")) <= leaf.maxHops))

        // ε-prefix: the tail itself is the trail, if it starts at a valid source
        val base = tails
          .join(srcsAfter, tails("__from") === srcsAfter(leaf.src), "left_semi")
          .select(
            col("__from").as(leaf.src), col("__tdst").as(leaf.dst),
            col("__tvs").as(vsCol), col("__tes").as(esCol))
          .localCheckpoint(true)

        // non-ε prefixes: extend known post-state trails with a tail;
        // fixpoint because newly found trails are prefixes of longer ones
        def extend(prefixes: DataFrame): DataFrame =
          prefixes
            .join(tails, prefixes(leaf.dst) === tails("__from"))
            .filter(!arrays_overlap(col(esCol), col("__tes")))
            .filter(size(col(esCol)) + size(col("__tes")) <= leaf.maxHops)
            .select(
              col(leaf.src), col("__tdst").as(leaf.dst),
              concat(col(vsCol), slice(col("__tvs"), 2, leaf.maxHops + 1)).as(vsCol),
              concat(col(esCol), col("__tes")).as(esCol))

        val stable = extend(surviving.drop(Rel.Cnt).unionByName(partB.drop(Rel.Cnt)))
        // base ∪ stable is duplicate-free (the last-new-edge decomposition
        // is unique per trail); the fixpoint is only reachable with >= 2
        // inserted edges — a single new edge cannot occur twice in a trail
        var acc = Rel.materialize(base.unionByName(stable))
        if (insEIds.size > 1) {
          var frontier = acc
          var iter = 0
          while (!frontier.isEmpty && iter < leaf.maxHops) {
            val next = Rel.materialize(extend(frontier)
              .join(acc, Seq(leaf.src, leaf.dst, vsCol, esCol), "left_anti")
              .distinct())
            // acc stays a lazy union over materialised frontiers
            acc = acc.unionByName(next)
            frontier = next
            iter += 1
          }
        }
        Rel.withCount(acc)
      }

    // --- fold into the internal trail state (deferred checkpointing, as in
    // StatefulNode) and emit the exposed delta
    val inserted = Rel.materialize(Rel.normalize(partB.unionByName(partA)))
    trailsAllPrev = trailsAll
    tfolds += 1
    val appended = surviving.unionByName(inserted)
    trailsAll =
      if (tfolds % StatefulNode.CheckpointEvery == 0) Rel.materialize(appended)
      else appended
    srcs = srcsAfter

    val delta = Rel.materialize(
      exposed(inserted).unionByName(Rel.negate(exposed(removed))))
    lastDeltaEmpty = delta.isEmpty
    prevDf = exposed(trailsAllPrev)
    cur = exposed(trailsAll)
    delta
  }

  override def stateRows: Long = if (trailsAll == null) 0L else trailsAll.count()
}
