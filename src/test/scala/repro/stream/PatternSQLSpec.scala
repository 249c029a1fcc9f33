package repro.stream

import repro.{Oracle, SparkSpec, TestWorkloads}
import repro.query.{Cst, PatternEdge, QueryPattern, Vr}

/** The pattern→SQL compiler, checked by running the compiled SQL on Spark
  * (Catalyst) and diffing against DuckDB through [[repro.Oracle]].
  */
class PatternSQLSpec extends SparkSpec {

  private def v(n: String) = Vr(n)
  private def c(l: String) = Cst(l)
  private def pe(s: repro.query.Term, l: String, t: repro.query.Term) = PatternEdge(s, l, t)

  test("compile emits one alias per pattern edge and sorted variable columns") {
    val q = QueryPattern(0, Vector(pe(v("y"), "knows", v("x")), pe(v("x"), "posted", c("p1"))))
    val (sql, cols) = PatternSQL.compile(q)
    assert(cols == Vector("x", "y"))
    assert(sql.contains("edges e0") && sql.contains("edges e1"))
    assert(sql.contains("e0.label = 'knows'") && sql.contains("e1.label = 'posted'"))
    assert(sql.contains("e1.dst = 'p1'"))
    assert(sql.contains("e1.src = e0.dst")) // shared variable x joins the aliases
  }

  test("compile escapes single quotes in literals") {
    val q = QueryPattern(0, Vector(pe(c("o'brien"), "knows", v("x"))))
    assert(PatternSQL.compile(q)._1.contains("'o''brien'"))
  }

  test("variable-free pattern compiles to a constant projection") {
    val q = QueryPattern(0, Vector(pe(c("a"), "knows", c("b"))))
    val (sql, cols) = PatternSQL.compile(q)
    assert(cols == Vector("m"))
    assert(sql.contains("CAST(1 AS INT) AS m"))
  }

  // Catalyst execution vs DuckDB over the same SQL on crafted graphs
  test("Spark evaluation of a chain pattern matches DuckDB") {
    import repro.graph.Edge
    val edges = Seq(
      Edge("a", "knows", "b"), Edge("b", "posted", "p1"),
      Edge("c", "knows", "d"), Edge("d", "posted", "p2"))
    val q = QueryPattern(0, Vector(pe(v("x"), "knows", v("y")), pe(v("y"), "posted", c("p1"))))
    val df = PatternSQL.evalOnSpark(spark, edges, q)
    Oracle.assertEquivalent(df, PatternSQL.compile(q)._1, "edges" -> PatternSQL.edgesDf(spark, edges))
  }

  test("Spark evaluation of a cyclic pattern matches DuckDB") {
    import repro.graph.Edge
    val edges = Seq(
      Edge("a", "k", "b"), Edge("b", "k", "a"), Edge("b", "k", "c"), Edge("c", "k", "a"))
    val q = QueryPattern(0, Vector(pe(v("x"), "k", v("y")), pe(v("y"), "k", v("x"))))
    val df = PatternSQL.evalOnSpark(spark, edges, q)
    Oracle.assertEquivalent(df, PatternSQL.compile(q)._1, "edges" -> PatternSQL.edgesDf(spark, edges))
  }

  // the real money tests: every engine's accumulated bindings, as a DataFrame,
  // must equal DuckDB's evaluation of the compiled pattern SQL over the final
  // edge table — a wrong trie propagation shows up as a wrong result here
  for ((name, stream, queries) <- TestWorkloads.crossWorkloads.take(2)) {
    for ((mkName, mk) <- Seq[(String, () => repro.engine.ContinuousEngine)](
           ("TRIC", () => new repro.core.TricEngine(false)),
           ("TRIC+", () => new repro.core.TricEngine(true)),
           ("INC", () => new repro.inv.InvEngine(true, false)))) {
      test(s"[$name] $mkName bindings oracle-checked against DuckDB (sampled queries)") {
        val engine = mk()
        engine.indexAll(queries)
        engine.replay(stream)
        val edgesDf = PatternSQL.edgesDf(spark, stream)
        // oracle-check a deterministic sample of queries with variables
        val sample = queries.filter(_.varNames.nonEmpty).take(8)
        for (q <- sample) {
          val (sql, _) = PatternSQL.compile(q)
          val df = PatternSQL.bindingsDf(spark, q, engine.bindings(q.id))
          Oracle.assertEquivalent(df, sql, "edges" -> edgesDf)
        }
      }
    }
  }
}
