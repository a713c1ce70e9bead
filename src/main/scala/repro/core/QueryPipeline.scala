package repro.core

import org.apache.spark.sql.DataFrame
import repro.cypher.CypherParser
import repro.eval.BatchEvaluator
import repro.fra.NraToFra
import repro.gra.CypherToGra
import repro.graph.PropertyGraph
import repro.ivm.IncrementalEngine
import repro.nra.GraToNra

/** The paper's end-to-end workflow (§4): openCypher text
  *   → GRA (step 1) → NRA (step 2) → FRA with inferred minimal schema
  *   (step 3) → either a one-shot evaluation or an incrementally maintained
  *   view (step 4).
  */
object QueryPipeline {

  /** Steps 1–3. */
  def compile(cypher: String,
      mode: NraToFra.SchemaMode = NraToFra.Inferred): NraToFra.Flattened =
    NraToFra.flatten(GraToNra.rewrite(CypherToGra.compile(CypherParser.parse(cypher))), mode)

  /** Full (non-incremental) evaluation — the recomputation baseline. */
  def evaluate(cypher: String, g: PropertyGraph): DataFrame =
    BatchEvaluator.eval(compile(cypher), g)

  /** Step 4: an incrementally maintained view over `initial`. */
  def incremental(cypher: String, initial: PropertyGraph,
      mode: NraToFra.SchemaMode = NraToFra.Inferred): IncrementalEngine =
    IncrementalEngine(compile(cypher, mode), initial)
}
