package repro.graph

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** A schema-free property graph snapshot, per the paper's §2 data model
  * `G = (V, E, st, L, T, ℓ, t, Pv, Pe)`.
  *
  * Realised as four flat DataFrames (the paper's nested relations α and β,
  * first-normal-form encoded so that property bags are fine-grained rows —
  * this is what makes FGN updates a single-row delta):
  *
  *  - `vertices(id: long, label: string)` — ℓ assigns one label per vertex
  *  - `vprops(id: long, key: string, value: string)` — the Pv partial functions
  *  - `edges(id: long, src: long, dst: long, typ: string)` — E, st, t
  *  - `eprops(id: long, key: string, value: string)` — the Pe partial functions
  *
  * Property values are stored as strings (the union of atomic domains D);
  * numeric comparisons cast at expression-evaluation time.
  */
final case class PropertyGraph(
    vertices: DataFrame,
    vprops: DataFrame,
    edges: DataFrame,
    eprops: DataFrame,
) {

  /** Materialise all four relations and truncate lineage; used after applying
    * deltas so repeated maintenance batches do not grow the logical plans.
    */
  def checkpointed(): PropertyGraph = PropertyGraph(
    vertices.localCheckpoint(true),
    vprops.localCheckpoint(true),
    edges.localCheckpoint(true),
    eprops.localCheckpoint(true),
  )

  def counts: (Long, Long, Long, Long) =
    (vertices.count(), vprops.count(), edges.count(), eprops.count())

  /** Apply a delta, producing the after-snapshot. Deletions are matched on
    * full rows for props (id,key,value) and on ids for vertices/edges, which
    * keeps the delta semantics unambiguous under fine-grained updates.
    */
  def apply(d: GraphDelta): PropertyGraph = {
    def minusById(base: DataFrame, del: DataFrame): DataFrame =
      base.join(del.select("id").distinct(), Seq("id"), "left_anti")
    def minusRows(base: DataFrame, del: DataFrame): DataFrame =
      base.join(del.distinct(), base.columns.toSeq, "left_anti")
    PropertyGraph(
      vertices = minusById(vertices, d.delVertices).unionByName(d.insVertices),
      vprops = minusRows(vprops, d.delVProps).unionByName(d.insVProps),
      edges = minusById(edges, d.delEdges).unionByName(d.insEdges),
      eprops = minusRows(eprops, d.delEProps).unionByName(d.insEProps),
    )
  }
}

object PropertyGraph {

  val vertexSchema: StructType = StructType(Seq(
    StructField("id", LongType, nullable = false),
    StructField("label", StringType, nullable = false),
  ))
  val propSchema: StructType = StructType(Seq(
    StructField("id", LongType, nullable = false),
    StructField("key", StringType, nullable = false),
    StructField("value", StringType, nullable = true),
  ))
  val edgeSchema: StructType = StructType(Seq(
    StructField("id", LongType, nullable = false),
    StructField("src", LongType, nullable = false),
    StructField("dst", LongType, nullable = false),
    StructField("typ", StringType, nullable = false),
  ))

  def emptyVertices(spark: SparkSession): DataFrame =
    spark.createDataFrame(spark.sparkContext.emptyRDD[Row], vertexSchema)
  def emptyProps(spark: SparkSession): DataFrame =
    spark.createDataFrame(spark.sparkContext.emptyRDD[Row], propSchema)
  def emptyEdges(spark: SparkSession): DataFrame =
    spark.createDataFrame(spark.sparkContext.emptyRDD[Row], edgeSchema)

  def empty(spark: SparkSession): PropertyGraph =
    PropertyGraph(emptyVertices(spark), emptyProps(spark), emptyEdges(spark), emptyProps(spark))

  /** Driver-side constructor for tests and small examples. */
  def fromElements(
      spark: SparkSession,
      vertices: Seq[(Long, String, Map[String, String])],
      edges: Seq[(Long, Long, Long, String, Map[String, String])],
  ): PropertyGraph = {
    import spark.implicits._
    val vpRows = vertices.flatMap { case (id, _, ps) => ps.map { case (k, v) => (id, k, v) } }
    val epRows = edges.flatMap { case (id, _, _, _, ps) => ps.map { case (k, v) => (id, k, v) } }
    PropertyGraph(
      if (vertices.isEmpty) emptyVertices(spark)
      else vertices.map { case (id, l, _) => (id, l) }.toDF("id", "label"),
      if (vpRows.isEmpty) emptyProps(spark) else vpRows.toDF("id", "key", "value"),
      if (edges.isEmpty) emptyEdges(spark)
      else edges.map { case (id, s, t, ty, _) => (id, s, t, ty) }.toDF("id", "src", "dst", "typ"),
      if (epRows.isEmpty) emptyProps(spark) else epRows.toDF("id", "key", "value"),
    )
  }
}
