package repro.query

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.Edge

/** Unit tests for genericization and update generalization (paper §4.1). */
class GenericSpec extends AnyFunSuite {

  test("genericize keeps literals and collapses variables") {
    assert(Generic.of(PatternEdge(Vr("x"), "knows", Vr("y"))) == GEdge(None, "knows", None))
    assert(Generic.of(PatternEdge(Cst("p1"), "knows", Vr("y"))) == GEdge(Some("p1"), "knows", None))
    assert(Generic.of(PatternEdge(Vr("x"), "posted", Cst("pst1"))) == GEdge(None, "posted", Some("pst1")))
    assert(Generic.of(PatternEdge(Cst("a"), "likes", Cst("b"))) == GEdge(Some("a"), "likes", Some("b")))
  }

  test("two structurally equal paths with different variable names genericize identically") {
    val p1 = Vector(PatternEdge(Vr("x"), "hasMod", Vr("y")), PatternEdge(Vr("y"), "posted", Cst("pst1")))
    val p2 = Vector(PatternEdge(Vr("a"), "hasMod", Vr("b")), PatternEdge(Vr("b"), "posted", Cst("pst1")))
    assert(Generic.ofPath(p1) == Generic.ofPath(p2))
  }

  test("an update has exactly four generalizations, most-specific first") {
    val gs = Generic.generalizations(Edge("p1", "knows", "p2"))
    assert(gs == Seq(
      GEdge(Some("p1"), "knows", Some("p2")),
      GEdge(Some("p1"), "knows", None),
      GEdge(None, "knows", Some("p2")),
      GEdge(None, "knows", None)))
    assert(gs.distinct.size == 4)
  }

  test("every generalization of an edge matches it") {
    val e = Edge("a", "l", "b")
    Generic.generalizations(e).foreach(g => assert(g.matches(e), g.show))
  }

  test("matches enforces the literal constraints") {
    val g = GEdge(Some("p1"), "knows", None)
    assert(g.matches(Edge("p1", "knows", "p9")))
    assert(!g.matches(Edge("p2", "knows", "p9")))
    assert(!g.matches(Edge("p1", "likes", "p9")))
    assert(!GEdge(None, "knows", Some("p2")).matches(Edge("p2", "knows", "p3")))
  }

  test("generalizations of a self-loop are still four distinct keys") {
    val gs = Generic.generalizations(Edge("a", "l", "a"))
    assert(gs.distinct.size == 4)
    gs.foreach(g => assert(g.matches(Edge("a", "l", "a"))))
  }
}
