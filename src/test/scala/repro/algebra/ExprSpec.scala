package repro.algebra

import org.apache.spark.sql.functions._
import repro.SparkSpec

class ExprSpec extends SparkSpec {
  import spark.implicits._

  private val df = Seq(
    ("en", "en", 10L, Seq(1L, 2L)),
    ("en", "de", 20L, Seq(3L)),
    (null, "de", 2L, Seq.empty[Long]),
  ).toDF("a", "b", "e", "path")

  private def ids(e: Expr) = df.filter(Expr.toColumn(e)).collect().map(_.getLong(2)).toSet

  test("string equality") { assert(ids(Cmp("=", ColRef("a"), ColRef("b"))) == Set(10L)) }

  test("inequality") { assert(ids(Cmp("<>", ColRef("a"), ColRef("b"))) == Set(20L)) }

  test("null comparisons are filtered (openCypher semantics)") {
    assert(ids(Cmp("=", ColRef("a"), Lit("de"))) == Set.empty)
    assert(ids(Cmp("<>", ColRef("a"), Lit("de"))) == Set(10L, 20L))
  }

  test("numeric coercion: string column vs numeric literal") {
    val d2 = Seq(("9", 1L), ("10", 2L), ("100", 3L)).toDF("v", "e")
    val got = d2.filter(Expr.toColumn(Cmp(">", ColRef("v"), Lit(9L)))).collect().map(_.getLong(1)).toSet
    assert(got == Set(2L, 3L)) // numeric, not lexicographic ("100" < "9" lexically)
  }

  test("AND / OR / NOT") {
    assert(ids(And(Cmp("=", ColRef("b"), Lit("de")), Cmp(">", ColRef("e"), Lit(5L)))) == Set(20L))
    assert(ids(Or(Cmp("=", ColRef("a"), ColRef("b")), Cmp("=", ColRef("e"), Lit(2L)))) == Set(10L, 2L))
    // three-valued logic: a=null makes the comparison null, NOT null stays
    // null and the row is filtered (openCypher matches SQL here)
    assert(ids(Not(Cmp("=", ColRef("a"), ColRef("b")))) == Set(20L))
  }

  test("NotInArray is edge-uniqueness") {
    assert(ids(NotInArray("path", "e")) == Set(10L, 20L, 2L))
    val d2 = Seq((Seq(5L), 5L)).toDF("path", "e")
    assert(d2.filter(Expr.toColumn(NotInArray("path", "e"))).isEmpty)
  }

  test("ArraysDisjoint") {
    val d2 = Seq((Seq(1L, 2L), Seq(2L, 3L), 1L), (Seq(1L), Seq(2L), 2L)).toDF("p1", "p2", "e")
    val got = d2.filter(Expr.toColumn(ArraysDisjoint("p1", "p2"))).collect().map(_.getLong(2)).toSet
    assert(got == Set(2L))
  }

  test("propRefs collects nested accesses") {
    val e = And(Cmp("=", PropRef("a", "x"), PropRef("b", "y")), Not(Cmp("<", PropRef("a", "x"), Lit(1L))))
    assert(e.propRefs.toSet == Set(PropRef("a", "x"), PropRef("b", "y")))
  }

  test("flatten rewrites PropRefs to flat columns") {
    val e = Cmp("=", PropRef("a", "x"), Lit("v")).flatten(_.flatName)
    assert(e == Cmp("=", ColRef("a__x"), Lit("v")))
  }

  test("toColumn on an unflattened PropRef fails loudly") {
    assertThrows[IllegalStateException](Expr.toColumn(PropRef("a", "x")))
  }

  test("conj of empty is None, of many is nested And") {
    assert(Expr.conj(Seq.empty).isEmpty)
    assert(Expr.conj(Seq(Lit(true), Lit(false))) == Some(And(Lit(true), Lit(false))))
  }
}
