package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import scala.collection.mutable

/** A single graph update operation. Updates to properties are fine-grained
  * (FGN): they touch one `(id, key)` cell of the property bag.
  */
sealed trait UpdateOp
final case class AddVertex(id: Long, label: String, props: Map[String, String]) extends UpdateOp
/** Cascades: removes the vertex's properties and all incident edges (with their properties). */
final case class RemoveVertex(id: Long) extends UpdateOp
final case class AddEdge(id: Long, src: Long, dst: Long, typ: String, props: Map[String, String]) extends UpdateOp
/** Cascades: removes the edge's properties. */
final case class RemoveEdge(id: Long) extends UpdateOp
final case class SetVertexProp(id: Long, key: String, value: String) extends UpdateOp
final case class RemoveVertexProp(id: Long, key: String) extends UpdateOp
final case class SetEdgeProp(id: Long, key: String, value: String) extends UpdateOp
final case class RemoveEdgeProp(id: Long, key: String) extends UpdateOp

/** Mutable holder of the current graph snapshot. Converts ordered batches of
  * [[UpdateOp]]s into a net [[GraphDelta]] (resolving cascades and old
  * property values against the current snapshot plus the batch's own pending
  * effects), applies it, and checkpoints the result so logical plans stay
  * bounded across thousands of batches.
  */
final class GraphStore(val spark: SparkSession, initial: PropertyGraph) {

  var current: PropertyGraph = initial.checkpointed()

  /** Snapshot before the most recent applyOps/applyDelta (for leaf diffing). */
  var previous: PropertyGraph = current

  private var folds = 0

  def applyDelta(d: GraphDelta): GraphDelta = {
    val dc = d.checkpointed()
    previous = current
    // checkpointing every batch costs four jobs; between checkpoints the
    // snapshot is a shallow (≤ CheckpointEvery) anti-join/union chain
    folds += 1
    val applied = current.apply(dc)
    current =
      if (folds % GraphStore.CheckpointEvery == 0) applied.checkpointed() else applied
    dc
  }

  /** Turn an ordered op batch into a net delta and apply it. */
  def applyOps(ops: Seq[UpdateOp]): GraphDelta = applyDelta(buildDelta(ops))

  /** Compute the net delta of `ops` against `current` without applying it. */
  def buildDelta(ops: Seq[UpdateOp]): GraphDelta = {
    // ---- prefetch: every row of the current graph that the batch may read.
    val vIds = ops.collect {
      case AddVertex(id, _, _) => id; case RemoveVertex(id) => id
      case SetVertexProp(id, _, _) => id; case RemoveVertexProp(id, _) => id
    }.distinct
    val eIdsDirect = ops.collect {
      case AddEdge(id, _, _, _, _) => id; case RemoveEdge(id) => id
      case SetEdgeProp(id, _, _) => id; case RemoveEdgeProp(id, _) => id
    }.distinct
    val removedV = ops.collect { case RemoveVertex(id) => id }.distinct

    val liveV: Map[Long, String] =
      if (vIds.isEmpty) Map.empty
      else current.vertices.filter(col("id").isin(vIds: _*)).collect()
        .map(r => r.getLong(0) -> r.getString(1)).toMap
    val liveVP: mutable.Map[(Long, String), String] = mutable.Map.from(
      if (vIds.isEmpty) Nil
      else current.vprops.filter(col("id").isin(vIds: _*)).collect()
        .map(r => (r.getLong(0), r.getString(1)) -> r.getString(2)))
    val incident: Seq[(Long, Long, Long, String)] =
      if (removedV.isEmpty) Nil
      else current.edges
        .filter(col("src").isin(removedV: _*) || col("dst").isin(removedV: _*))
        .collect().map(r => (r.getLong(0), r.getLong(1), r.getLong(2), r.getString(3))).toSeq
    val eIds = (eIdsDirect ++ incident.map(_._1)).distinct
    val liveE: Map[Long, (Long, Long, String)] =
      if (eIds.isEmpty) Map.empty
      else current.edges.filter(col("id").isin(eIds: _*)).collect()
        .map(r => r.getLong(0) -> ((r.getLong(1), r.getLong(2), r.getString(3)))).toMap
    val liveEP: mutable.Map[(Long, String), String] = mutable.Map.from(
      if (eIds.isEmpty) Nil
      else current.eprops.filter(col("id").isin(eIds: _*)).collect()
        .map(r => (r.getLong(0), r.getString(1)) -> r.getString(2)))

    // ---- fold ops into net pending effects (batch-local view on top of live).
    val insV = mutable.LinkedHashMap.empty[Long, String]
    val delV = mutable.LinkedHashSet.empty[Long]
    val insVP = mutable.LinkedHashMap.empty[(Long, String), String]
    val delVP = mutable.LinkedHashSet.empty[(Long, String, String)]
    val insE = mutable.LinkedHashMap.empty[Long, (Long, Long, String)]
    val delE = mutable.LinkedHashSet.empty[Long]
    val insEP = mutable.LinkedHashMap.empty[(Long, String), String]
    val delEP = mutable.LinkedHashSet.empty[(Long, String, String)]

    def vpropNow(id: Long, key: String): Option[String] =
      insVP.get((id, key)).orElse {
        if (delVP.exists(d => d._1 == id && d._2 == key) || delV.contains(id)) None
        else liveVP.get((id, key))
      }
    def epropNow(id: Long, key: String): Option[String] =
      insEP.get((id, key)).orElse {
        if (delEP.exists(d => d._1 == id && d._2 == key) || delE.contains(id)) None
        else liveEP.get((id, key))
      }
    def dropVertexProp(id: Long, key: String): Unit =
      vpropNow(id, key).foreach { old =>
        if (insVP.remove((id, key)).isEmpty) delVP += ((id, key, old))
      }
    def dropEdgeProp(id: Long, key: String): Unit =
      epropNow(id, key).foreach { old =>
        if (insEP.remove((id, key)).isEmpty) delEP += ((id, key, old))
      }
    def dropEdge(id: Long): Unit = {
      val pendingKeys = insEP.keys.filter(_._1 == id).toSeq
      pendingKeys.foreach(insEP.remove)
      liveEP.keys.filter(_._1 == id).foreach { case (i, k) =>
        if (!delE.contains(i)) delEP += ((i, k, liveEP((i, k))))
      }
      if (insE.remove(id).isEmpty) { if (liveE.contains(id)) delE += id }
    }

    ops.foreach {
      case AddVertex(id, label, props) =>
        insV(id) = label
        props.foreach { case (k, v) => dropVertexProp(id, k); insVP((id, k)) = v }
      case RemoveVertex(id) =>
        // cascade: incident edges (live ones prefetched; pending ones scanned here)
        incident.filter(e => e._2 == id || e._3 == id).foreach(e => dropEdge(e._1))
        insE.filter { case (_, (s, t, _)) => s == id || t == id }.keys.toSeq.foreach(dropEdge)
        insVP.keys.filter(_._1 == id).toSeq.foreach(insVP.remove)
        liveVP.keys.filter(_._1 == id).foreach { case (i, k) =>
          if (!delV.contains(i)) delVP += ((i, k, liveVP((i, k))))
        }
        if (insV.remove(id).isEmpty) { if (liveV.contains(id)) delV += id }
      case AddEdge(id, s, t, ty, props) =>
        insE(id) = ((s, t, ty))
        props.foreach { case (k, v) => dropEdgeProp(id, k); insEP((id, k)) = v }
      case RemoveEdge(id) => dropEdge(id)
      case SetVertexProp(id, k, v) => dropVertexProp(id, k); insVP((id, k)) = v
      case RemoveVertexProp(id, k) => dropVertexProp(id, k)
      case SetEdgeProp(id, k, v) => dropEdgeProp(id, k); insEP((id, k)) = v
      case RemoveEdgeProp(id, k) => dropEdgeProp(id, k)
    }

    // A vertex/edge replaced within the batch (remove+add of a live id) needs
    // both the delete and the insert; LinkedHashSet/Map already hold both.
    // A re-added live vertex (AddVertex on an id not removed first) replaces
    // the row: mark it deleted too so `apply` swaps it.
    insV.keys.foreach { id => if (liveV.contains(id)) delV += id }
    insE.keys.foreach { id => if (liveE.contains(id)) delE += id }

    import spark.implicits._
    def vdf(m: Seq[(Long, String)]): DataFrame =
      if (m.isEmpty) PropertyGraph.emptyVertices(spark) else m.toDF("id", "label")
    def pdf(m: Seq[(Long, String, String)]): DataFrame =
      if (m.isEmpty) PropertyGraph.emptyProps(spark) else m.toDF("id", "key", "value")
    def edf(m: Seq[(Long, Long, Long, String)]): DataFrame =
      if (m.isEmpty) PropertyGraph.emptyEdges(spark) else m.toDF("id", "src", "dst", "typ")

    GraphDelta(
      insVertices = vdf(insV.toSeq),
      delVertices = vdf(delV.toSeq.map(id => (id, liveV.getOrElse(id, "")))),
      insVProps = pdf(insVP.toSeq.map { case ((i, k), v) => (i, k, v) }),
      delVProps = pdf(delVP.toSeq),
      insEdges = edf(insE.toSeq.map { case (i, (s, t, ty)) => (i, s, t, ty) }),
      delEdges = edf(delE.toSeq.map { id =>
        val (s, t, ty) = liveE(id); (id, s, t, ty)
      }),
      insEProps = pdf(insEP.toSeq.map { case ((i, k), v) => (i, k, v) }),
      delEProps = pdf(delEP.toSeq),
      stats = Some(DeltaStats(
        insV.size, delV.size, insVP.size, delVP.size,
        insE.size, delE.size, insEP.size, delEP.size,
        vLabels = insV.values.toSet ++ delV.flatMap(liveV.get),
        vpropKeys = insVP.keysIterator.map(_._2).toSet ++ delVP.map(_._2),
        eTypes = insE.values.map(_._3).toSet ++ delE.flatMap(id => liveE.get(id).map(_._3)),
        epropKeys = insEP.keysIterator.map(_._2).toSet ++ delEP.map(_._2),
      )),
      rows = Some(DeltaRows(
        insV.toSeq,
        delV.toSeq.map(id => (id, liveV.getOrElse(id, ""))),
        insVP.toSeq.map { case ((i, k), v) => (i, k, v) },
        delVP.toSeq,
        insE.toSeq.map { case (i, (s, t, ty)) => (i, s, t, ty) },
        delE.toSeq.map { id => val (s, t, ty) = liveE(id); (id, s, t, ty) },
        insEP.toSeq.map { case ((i, k), v) => (i, k, v) },
        delEP.toSeq,
      )),
    )
  }

  /** Lookup helpers used by the coarse-grained FGN baseline (Table 4) and by
    * the update-stream generator.
    */
  def vertexLabel(id: Long): Option[String] =
    current.vertices.filter(col("id") === id).collect().headOption.map(_.getString(1))
  def vertexProps(id: Long): Map[String, String] =
    current.vprops.filter(col("id") === id).collect()
      .map(r => r.getString(1) -> r.getString(2)).toMap
  def incidentEdges(id: Long): Seq[(Long, Long, Long, String, Map[String, String])] = {
    val es = current.edges.filter(col("src") === id || col("dst") === id).collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getLong(2), r.getString(3)))
    if (es.isEmpty) Nil
    else {
      val ids = es.map(_._1)
      val props = current.eprops.filter(col("id").isin(ids: _*)).collect()
        .groupBy(_.getLong(0))
        .map { case (i, rs) => i -> rs.map(r => r.getString(1) -> r.getString(2)).toMap }
      es.map { case (i, s, t, ty) => (i, s, t, ty, props.getOrElse(i, Map.empty[String, String])) }.toSeq
    }
  }
}

object GraphStore {
  /** Snapshot lineage-truncation period (see applyDelta). */
  val CheckpointEvery = 4
}
