package repro.query

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.Edge

/** Unit tests for the query model itself (terms, patterns, local matching). */
class QueryModelSpec extends AnyFunSuite {

  test("terms are listed in first-appearance order, once each") {
    val q = QueryPattern(0, Vector(
      PatternEdge(Vr("b"), "x", Vr("a")), PatternEdge(Vr("a"), "y", Cst("k")),
      PatternEdge(Vr("b"), "z", Cst("k"))))
    assert(q.terms == Vector(Vr("b"), Vr("a"), Cst("k")))
  }

  test("varNames are distinct and sorted") {
    val q = QueryPattern(0, Vector(
      PatternEdge(Vr("z"), "x", Vr("a")), PatternEdge(Vr("a"), "y", Vr("z"))))
    assert(q.varNames == Vector("a", "z"))
  }

  test("a pattern without edges is rejected") {
    intercept[IllegalArgumentException](QueryPattern(0, Vector.empty))
  }

  test("matchesLocally checks label and literal endpoints only") {
    val pe = PatternEdge(Cst("a"), "l", Vr("x"))
    assert(pe.matchesLocally(Edge("a", "l", "anything")))
    assert(!pe.matchesLocally(Edge("b", "l", "anything")))
    assert(!pe.matchesLocally(Edge("a", "m", "anything")))
    assert(PatternEdge(Vr("x"), "l", Vr("y")).matchesLocally(Edge("p", "l", "q")))
  }

  test("term show forms are distinct for literals and variables") {
    assert(Cst("a").show == "\"a\"")
    assert(Vr("x").show == "?x")
    assert(Cst("a").isVar == false && Vr("x").isVar == true)
  }

  test("pattern show includes the id and every edge") {
    val q = QueryPattern(7, Vector(PatternEdge(Vr("x"), "knows", Cst("p1"))))
    assert(q.show.contains("Q7"))
    assert(q.show.contains("knows"))
    assert(q.show.contains("\"p1\""))
  }

  test("edge toString is the arrow form") {
    assert(Edge("a", "l", "b").toString == "a -[l]-> b")
  }
}
