package repro.ivm

import org.apache.spark.sql.functions._
import repro.SparkSpec

class RelSpec extends SparkSpec {
  import spark.implicits._

  test("withCount attaches constant multiplicity") {
    val df = Rel.withCount(Seq(1, 2).toDF("x"))
    assert(df.columns.toSeq == Seq("x", Rel.Cnt))
    assert(df.collect().forall(_.getLong(1) == 1L))
  }

  test("normalize merges duplicates and drops zeros") {
    val df = Seq((1, 2L), (1, 3L), (2, -1L), (2, 1L)).toDF("x", Rel.Cnt)
    val n = Rel.normalize(df).collect().map(r => (r.getInt(0), r.getLong(1))).toMap
    assert(n == Map(1 -> 5L))
  }

  test("add sums counts across relations") {
    val a = Seq((1, 1L)).toDF("x", Rel.Cnt)
    val b = Seq((1, 2L), (2, 1L)).toDF("x", Rel.Cnt)
    val s = Rel.add(a, b).collect().map(r => (r.getInt(0), r.getLong(1))).toMap
    assert(s == Map(1 -> 3L, 2 -> 1L))
  }

  test("add aligns columns by name") {
    val a = Seq((1, "u", 1L)).toDF("x", "y", Rel.Cnt)
    val b = Seq(("u", 1, 1L)).toDF("y", "x", Rel.Cnt)
    assert(Rel.add(a, b).collect().head.getLong(2) == 2L)
  }

  test("negate flips signs") {
    val df = Seq((1, 2L)).toDF("x", Rel.Cnt)
    assert(Rel.negate(df).collect().head.getLong(1) == -2L)
  }

  test("expand duplicates rows by count") {
    val df = Seq((1, 3L), (2, 1L)).toDF("x", Rel.Cnt)
    val xs = Rel.expand(df).collect().map(_.getInt(0)).sorted.toSeq
    assert(xs == Seq(1, 1, 1, 2))
  }

  test("sameBag accepts equal bags and rejects different ones") {
    val counted = Seq((1, 2L), (2, 1L)).toDF("x", Rel.Cnt)
    assert(Rel.sameBag(counted, Seq(1, 1, 2).toDF("x")))
    assert(!Rel.sameBag(counted, Seq(1, 2).toDF("x")))
  }

  test("normalize groups array columns (path state)") {
    val df = Seq((Seq(1L, 2L), 1L), (Seq(1L, 2L), 1L), (Seq(2L, 3L), 1L)).toDF("p", Rel.Cnt)
    val n = Rel.normalize(df).collect().map(r => (r.getSeq[Long](0), r.getLong(1))).toMap
    assert(n == Map(Seq(1L, 2L) -> 2L, Seq(2L, 3L) -> 1L))
  }

  test("materialize preserves contents") {
    val df = Rel.materialize(Seq((1, 1L)).toDF("x", Rel.Cnt))
    assert(df.collect().map(r => (r.getInt(0), r.getLong(1))).toSeq == Seq((1, 1L)))
  }
}
