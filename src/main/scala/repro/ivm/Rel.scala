package repro.ivm

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Bag-relation utilities for IVM (Griffin–Libkin-style maintenance with
  * duplicates, paper ref [10]).
  *
  * Every operator state and delta is a DataFrame whose last column is the
  * signed multiplicity `__cnt: long`. States are kept normalised: one row
  * per distinct tuple, strictly positive count. Deltas may carry negative
  * counts.
  */
object Rel {

  val Cnt = "__cnt"

  /** Attach a constant multiplicity to a plain relation. */
  def withCount(df: DataFrame, n: Long = 1L): DataFrame = df.withColumn(Cnt, lit(n))

  def dataCols(df: DataFrame): Seq[String] = df.columns.toSeq.filterNot(_ == Cnt)

  /** Merge equal tuples, summing multiplicities; drop zeros. Grouping on
    * array columns (paths) is supported by Catalyst.
    */
  def normalize(df: DataFrame): DataFrame = {
    val cols = dataCols(df)
    df.groupBy(cols.map(col): _*)
      .agg(sum(Cnt).as(Cnt))
      .filter(col(Cnt) =!= 0L)
  }

  def negate(df: DataFrame): DataFrame = df.withColumn(Cnt, -col(Cnt))

  /** Normalised sum of two counted relations (schemas must match by name). */
  def add(a: DataFrame, b: DataFrame): DataFrame =
    normalize(a.unionByName(b.select(a.columns.map(col): _*)))

  /** Materialise and truncate lineage — called once per node per batch so
    * thousands of maintenance batches keep bounded plans.
    */
  def materialize(df: DataFrame): DataFrame = df.localCheckpoint(true)

  /** Expand multiplicities into duplicate rows (for bag comparison against a
    * plain relation). Normalises first so lazily-folded states with
    * cancelling rows expand correctly; counts must net to ≥ 0.
    */
  def expand(df: DataFrame): DataFrame = {
    val n = normalize(df)
    val cols = dataCols(n)
    n.withColumn("__dup", explode(sequence(lit(1L), col(Cnt))))
      .select(cols.map(col): _*)
  }

  /** True iff the counted relation equals the plain relation as a bag. */
  def sameBag(counted: DataFrame, plain: DataFrame): Boolean = {
    val c = normalize(counted)
    val counts = normalize(withCount(plain)).select(c.columns.map(col): _*)
    val l = c.exceptAll(counts)
    val r = counts.exceptAll(c)
    l.isEmpty && r.isEmpty
  }
}
