package repro.core

import org.scalatest.funsuite.AnyFunSuite

class QuerySpec extends AnyFunSuite {

  test("all operators render their SQL form") {
    assert(Cond("a", Op.Lt, 1).toSql == "a < 1")
    assert(Cond("a", Op.Le, 1).toSql == "a <= 1")
    assert(Cond("a", Op.Gt, 1).toSql == "a > 1")
    assert(Cond("a", Op.Ge, 1).toSql == "a >= 1")
    assert(Cond("a", Op.Eq, 1).toSql == "a = 1")
    assert(Cond("a", Op.Ne, 1).toSql == "a <> 1")
  }

  test("string literals are quoted and escaped") {
    assert(Cond("s", Op.Eq, "x").toSql == "s = 'x'")
    assert(Cond("s", Op.Eq, "it's").toSql == "s = 'it''s'")
  }

  test("nested AND/OR trees render with parentheses") {
    val t = Or(List(And(List(Cond("a", Op.Lt, 1), Cond("b", Op.Gt, 2))), Cond("c", Op.Eq, 3)))
    assert(t.toSql == "((a < 1) AND (b > 2)) OR (c = 3)")
  }

  test("columns collects every referenced column") {
    val t = Or(List(And(List(Cond("a", Op.Lt, 1), Cond("b", Op.Gt, 2))), Cond("a", Op.Eq, 3)))
    assert(t.columns == Set("a", "b"))
    val q = Query(AggFn.Sum, "x", Some(t), groupBy = Some("g"))
    assert(q.columns == Set("x", "a", "b", "g"))
  }

  test("hasOr detects OR anywhere in the tree") {
    assert(!Cond("a", Op.Lt, 1).hasOr)
    assert(!And(List(Cond("a", Op.Lt, 1), Cond("b", Op.Gt, 2))).hasOr)
    assert(Or(List(Cond("a", Op.Lt, 1))).hasOr)
    assert(And(List(Cond("a", Op.Lt, 1), Or(List(Cond("b", Op.Gt, 2))))).hasOr)
  }

  test("toSql renders every aggregation function") {
    for ((fn, sql) <- Seq(
      AggFn.Count -> "count", AggFn.Sum -> "sum", AggFn.Avg -> "avg",
      AggFn.Min -> "min", AggFn.Max -> "max", AggFn.Median -> "median", AggFn.Var -> "var_pop"
    )) {
      assert(Query(fn, "x", None).toSql("t") == s"SELECT ${sql}(x) AS result FROM t")
    }
  }

  test("toSql renders WHERE and GROUP BY") {
    val q = Query(AggFn.Avg, "x", Some(Cond("a", Op.Ge, 5)), Some("g"))
    assert(q.toSql("t") == "SELECT g AS grp, avg(x) AS result FROM t WHERE a >= 5 GROUP BY g")
  }

  test("AggFn.all covers the seven supported aggregations") {
    assert(AggFn.all.size == 7)
    assert(AggFn.all.map(_.sqlName).distinct.size == 7)
  }
}
