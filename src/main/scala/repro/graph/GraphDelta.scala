package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** A fine-grained change set against a [[PropertyGraph]].
  *
  * Insert/delete pairs for each of the four base relations. A property
  * *update* is represented fine-grained (FGN) as `delVProps(id,key,old)` +
  * `insVProps(id,key,new)` — the vertex row itself is untouched, so
  * downstream operators whose schema does not mention that property see an
  * empty delta.
  *
  * Invariants expected by the engine (enforced by [[GraphStore]] /
  * [[UpdateStream]], asserted in tests):
  *  - deleting a vertex also deletes its properties and incident edges
  *  - deleting an edge also deletes its properties
  *  - inserted ids do not collide with live ids (re-insertion of a deleted
  *    id inside the same batch is allowed and means replacement)
  */
final case class GraphDelta(
    insVertices: DataFrame,
    delVertices: DataFrame,
    insVProps: DataFrame,
    delVProps: DataFrame,
    insEdges: DataFrame,
    delEdges: DataFrame,
    insEProps: DataFrame,
    delEProps: DataFrame,
    stats: Option[DeltaStats] = None,
    rows: Option[DeltaRows] = None,
) {

  /** True when the batch provably touches no vertex row or vertex property
    * (stats are filled by [[GraphStore]]; without stats this is
    * conservatively false so nothing is skipped).
    */
  def noVertexChanges: Boolean =
    stats.exists(s => s.insV == 0 && s.delV == 0 && s.insVP == 0 && s.delVP == 0)

  def noEdgeChanges: Boolean =
    stats.exists(s => s.insE == 0 && s.delE == 0 && s.insEP == 0 && s.delEP == 0)

  /** True when no edge row and no vertex row changed (property-only batch). */
  def noTopologyChanges: Boolean =
    stats.exists(s => s.insV == 0 && s.delV == 0 && s.insE == 0 && s.delE == 0)

  /** Vertex ids whose label or property bag changed (drives leaf re-derivation). */
  def touchedVertexIds: DataFrame = rows match {
    case Some(r) =>
      val spark = insVertices.sparkSession
      import spark.implicits._
      r.touchedVertexIdSeq.toDF("id")
    case None =>
      insVertices.select("id")
        .unionByName(delVertices.select("id"))
        .unionByName(insVProps.select("id"))
        .unionByName(delVProps.select("id"))
        .distinct()
  }

  /** Edge ids whose endpoints/type or property bag changed. */
  def touchedEdgeIds: DataFrame = rows match {
    case Some(r) =>
      val spark = insEdges.sparkSession
      import spark.implicits._
      r.touchedEdgeIdSeq.toDF("id")
    case None =>
      insEdges.select("id")
        .unionByName(delEdges.select("id"))
        .unionByName(insEProps.select("id"))
        .unionByName(delEProps.select("id"))
        .distinct()
  }

  def isEmpty: Boolean =
    Seq(insVertices, delVertices, insVProps, delVProps, insEdges, delEdges, insEProps, delEProps)
      .forall(_.isEmpty)

  /** Materialise every member so the engine can reuse them across operators
    * without recomputation.
    */
  def checkpointed(): GraphDelta =
    // deltas built from driver rows are already local — checkpointing them
    // would only spend eight Spark jobs per batch
    if (rows.isDefined) this
    else GraphDelta(
      insVertices.localCheckpoint(true), delVertices.localCheckpoint(true),
      insVProps.localCheckpoint(true), delVProps.localCheckpoint(true),
      insEdges.localCheckpoint(true), delEdges.localCheckpoint(true),
      insEProps.localCheckpoint(true), delEProps.localCheckpoint(true),
      stats, rows,
    )
}

/** Driver-side copy of a delta's rows (present when the delta was built by
  * [[GraphStore]] from an op batch) — consumers read these instead of
  * collecting, eliminating per-batch Spark round-trips.
  */
final case class DeltaRows(
    insV: Seq[(Long, String)], delV: Seq[(Long, String)],
    insVP: Seq[(Long, String, String)], delVP: Seq[(Long, String, String)],
    insE: Seq[(Long, Long, Long, String)], delE: Seq[(Long, Long, Long, String)],
    insEP: Seq[(Long, String, String)], delEP: Seq[(Long, String, String)],
) {
  def touchedVertexIdSeq: Seq[Long] =
    (insV.map(_._1) ++ delV.map(_._1) ++ insVP.map(_._1) ++ delVP.map(_._1)).distinct
  def touchedEdgeIdSeq: Seq[Long] =
    (insE.map(_._1) ++ delE.map(_._1) ++ insEP.map(_._1) ++ delEP.map(_._1)).distinct
}

/** Driver-side summary of a delta — free to compute when the delta is built
  * from driver collections. Maintenance nodes use it as a *discrimination
  * network* (in the Rete sense): a leaf whose label/type/property-key
  * footprint is disjoint from the batch skips its whole maintenance step
  * without touching Spark.
  */
final case class DeltaStats(
    insV: Long, delV: Long, insVP: Long, delVP: Long,
    insE: Long, delE: Long, insEP: Long, delEP: Long,
    vLabels: Set[String] = Set.empty,   // labels of inserted+deleted vertex rows
    vpropKeys: Set[String] = Set.empty, // keys of changed vertex properties
    eTypes: Set[String] = Set.empty,    // types of inserted+deleted edges
    epropKeys: Set[String] = Set.empty, // keys of changed edge properties
) {
  def anyVertexRows: Boolean = insV > 0 || delV > 0
  def anyEdgeRows: Boolean = insE > 0 || delE > 0

  /** Did any vertex row with this label (None = any label) change? */
  def touchesVertexLabel(label: Option[String]): Boolean =
    anyVertexRows && label.forall(vLabels.contains)

  /** Did any edge row of this type (None = any type) change? */
  def touchesEdgeType(typ: Option[String]): Boolean =
    anyEdgeRows && typ.forall(eTypes.contains)

  def touchesVertexProps(keys: Iterable[String]): Boolean =
    (insVP > 0 || delVP > 0) && keys.exists(vpropKeys.contains)

  def touchesEdgeProps(keys: Iterable[String]): Boolean =
    (insEP > 0 || delEP > 0) && keys.exists(epropKeys.contains)
}

object GraphDelta {

  def empty(spark: SparkSession): GraphDelta = GraphDelta(
    PropertyGraph.emptyVertices(spark), PropertyGraph.emptyVertices(spark),
    PropertyGraph.emptyProps(spark), PropertyGraph.emptyProps(spark),
    PropertyGraph.emptyEdges(spark), PropertyGraph.emptyEdges(spark),
    PropertyGraph.emptyProps(spark), PropertyGraph.emptyProps(spark),
  )

  /** Driver-side constructor for tests: element-style inserts/deletes.
    * Deletions here are given as full elements (so prop deletions are exact
    * rows); cascading is the caller's responsibility (use [[GraphStore]] for
    * cascades).
    */
  def fromElements(
      spark: SparkSession,
      insV: Seq[(Long, String, Map[String, String])] = Seq.empty,
      delV: Seq[(Long, String, Map[String, String])] = Seq.empty,
      insE: Seq[(Long, Long, Long, String, Map[String, String])] = Seq.empty,
      delE: Seq[(Long, Long, Long, String, Map[String, String])] = Seq.empty,
      insVP: Seq[(Long, String, String)] = Seq.empty,
      delVP: Seq[(Long, String, String)] = Seq.empty,
      insEP: Seq[(Long, String, String)] = Seq.empty,
      delEP: Seq[(Long, String, String)] = Seq.empty,
  ): GraphDelta = {
    import spark.implicits._
    def props(p: Seq[(Long, String, String)]): DataFrame =
      if (p.isEmpty) PropertyGraph.emptyProps(spark) else p.toDF("id", "key", "value")
    val insG = PropertyGraph.fromElements(spark, insV, insE)
    val delG = PropertyGraph.fromElements(spark, delV, delE)
    GraphDelta(
      insVertices = insG.vertices,
      delVertices = delG.vertices,
      insVProps = insG.vprops.unionByName(props(insVP)),
      delVProps = delG.vprops.unionByName(props(delVP)),
      insEdges = insG.edges,
      delEdges = delG.edges,
      insEProps = insG.eprops.unionByName(props(insEP)),
      delEProps = delG.eprops.unionByName(props(delEP)),
    )
  }
}
