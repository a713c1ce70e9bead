package repro.eval

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.fra._
import repro.graph.PropertyGraph

/** Shared snapshot evaluation of FRA leaves and row-wise helpers. Used by
  * the full-recomputation baseline ([[BatchEvaluator]]) and by the IVM
  * leaves (which evaluate restricted to affected ids).
  */
object FraEval {

  /** Distinct property keys present in the data; needed only by the naive
    * all-properties baseline.
    */
  final case class PropKeys(vertexKeys: Seq[String], edgeKeys: Seq[String])

  def propKeys(g: PropertyGraph): PropKeys = PropKeys(
    g.vprops.select("key").distinct().collect().map(_.getString(0)).sorted.toSeq,
    g.eprops.select("key").distinct().collect().map(_.getString(0)).sorted.toSeq,
  )

  /** Effective property map of a vertex leaf: declared (minimal-schema)
    * props plus, in naive mode, every key in the data.
    */
  def effectiveVertexProps(l: FGetVertices, keys: => PropKeys): Map[String, String] =
    if (!l.allProps) l.props
    else keys.vertexKeys.map(k => k -> l.props.getOrElse(k, s"${l.v}__$k")).toMap ++ l.props

  def effectiveEdgeProps(g: FGetEdges, keys: => PropKeys): Map[String, String] =
    if (!g.allProps) g.edgeProps
    else keys.edgeKeys.map(k => k -> g.edgeProps.getOrElse(k, s"${g.edge}__$k")).toMap ++ g.edgeProps

  /** `◯(v:label{props})` on a snapshot. Missing properties yield nulls
    * (openCypher semantics: accessing an absent property gives null).
    */
  def getVertices(g: PropertyGraph, v: String, label: Option[String],
      props: Map[String, String]): DataFrame = {
    var df = g.vertices
      .filter(label.map(col("label") === _).getOrElse(lit(true)))
      .select(col("id").as(v))
    props.foreach { case (key, out) =>
      val p = g.vprops.filter(col("key") === key).select(col("id").as(v), col("value").as(out))
      df = df.join(p, Seq(v), "left")
    }
    df
  }

  /** `⇑` on a snapshot: typed edges in traversal orientation, endpoint
    * labels checked, pushed-down properties attached.
    */
  def getEdges(g: PropertyGraph, leaf: FGetEdges, edgeProps: Map[String, String]): DataFrame = {
    val oriented = {
      val e = g.edges.filter(leaf.typ.map(col("typ") === _).getOrElse(lit(true)))
      if (!leaf.reversed) e.select(col("src").as(leaf.src), col("id").as(leaf.edge), col("dst").as(leaf.dst))
      else e.select(col("dst").as(leaf.src), col("id").as(leaf.edge), col("src").as(leaf.dst))
    }
    var df = oriented
    def labelIds(l: String, as: String): DataFrame =
      g.vertices.filter(col("label") === l).select(col("id").as(as))
    leaf.srcLabel.foreach(l => df = df.join(labelIds(l, leaf.src), Seq(leaf.src)))
    leaf.dstLabel.foreach(l => df = df.join(labelIds(l, leaf.dst), Seq(leaf.dst)))
    def attach(props: Map[String, String], idCol: String, table: DataFrame): Unit =
      props.foreach { case (key, out) =>
        val p = table.filter(col("key") === key).select(col("id").as(idCol), col("value").as(out))
        df = df.join(p, Seq(idCol), "left")
      }
    attach(leaf.srcProps, leaf.src, g.vprops)
    attach(edgeProps, leaf.edge, g.eprops)
    attach(leaf.dstProps, leaf.dst, g.vprops)
    df
  }

  /** Oriented, typed single edges for closure computations:
    * columns (__from, __to, __eid).
    */
  def orientedEdges(g: PropertyGraph, typ: Option[String], reversed: Boolean): DataFrame = {
    val e = g.edges.filter(typ.map(col("typ") === _).getOrElse(lit(true)))
    if (!reversed) e.select(col("src").as("__from"), col("dst").as("__to"), col("id").as("__eid"))
    else e.select(col("dst").as("__from"), col("src").as("__to"), col("id").as("__eid"))
  }

  /** Trails (no repeated edge — openCypher semantics) of length 1..maxHops
    * from the given source vertices over the given oriented edges. Output:
    * (src, dst, vs, es) named per the leaf; the caller applies min-hop
    * filtering (`outputFilter`) — shorter trails are still needed as
    * prefixes during maintenance.
    *
    * `sources`: single column named `leaf.src`.
    */
  def trails(leaf: FTransitiveEdges, sources: DataFrame, edges: DataFrame): DataFrame = {
    val vsCol = s"${leaf.pathName}__vs"
    val esCol = s"${leaf.pathName}__es"
    var frontier = sources
      .join(edges, sources(leaf.src) === edges("__from"))
      .select(
        col(leaf.src),
        col("__to").as(leaf.dst),
        array(col(leaf.src), col("__to")).as(vsCol),
        array(col("__eid")).as(esCol),
      )
      .localCheckpoint(true)
    var acc = frontier
    var hops = 1
    var done = frontier.isEmpty
    while (hops < leaf.maxHops && !done) {
      frontier = frontier
        .join(edges, frontier(leaf.dst) === edges("__from"))
        .filter(!array_contains(col(esCol), col("__eid")))
        .select(
          col(leaf.src),
          col("__to").as(leaf.dst),
          concat(col(vsCol), array(col("__to"))).as(vsCol),
          concat(col(esCol), array(col("__eid"))).as(esCol),
        )
        .localCheckpoint(true)
      hops += 1
      done = frontier.isEmpty
      if (!done) acc = acc.unionByName(frontier)
    }
    acc
  }

  /** min..max hop filter on a trail relation. */
  def hopFilter(leaf: FTransitiveEdges): Column = {
    val len = size(col(s"${leaf.pathName}__es"))
    len >= leaf.minHops && len <= leaf.maxHops
  }

  /** Canonical display string of a path: vertex ids joined by "→". */
  def pathString(pathName: String): Column =
    concat_ws("→", transform(col(s"${pathName}__vs"), _.cast("string")))

  /** Natural join columns of two schemas, with a guard against accidental
    * duplicate non-key columns (can only arise from a planner bug).
    */
  def joinKeys(left: Seq[String], right: Seq[String]): Seq[String] = left.intersect(right)

  def projItem(item: (ProjExpr, String)): Column = item match {
    case (PCol(n), a) => col(n).as(a)
    case (PPath(p), a) => pathString(p).as(a)
  }
}
