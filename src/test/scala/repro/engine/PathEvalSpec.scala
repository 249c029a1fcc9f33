package repro.engine

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.Edge
import repro.query.{Cst, GEdge, Generic, PatternEdge, QueryPattern, Vr}

import scala.collection.mutable

/** Unit tests for path materialization (full + delta) and the final
  * cross-path join with variable constraints.
  */
class PathEvalSpec extends AnyFunSuite {

  private def pe(s: repro.query.Term, l: String, t: repro.query.Term) = PatternEdge(s, l, t)

  /** Build generic-edge views from a set of concrete edges (as both engines do). */
  private def mats(edges: Seq[Edge], paths: Seq[Vector[PatternEdge]]): GEdge => Option[Rel] = {
    val m = mutable.HashMap.empty[GEdge, Rel]
    for (p <- paths; peg <- p.map(Generic.of)) m.getOrElseUpdate(peg, new Rel(2))
    for (e <- edges; (g, r) <- m if g.matches(e)) r.add(Array(e.src, e.dst))
    m.get
  }

  private val edges = Seq(
    Edge("f1", "hasMod", "p1"), Edge("f2", "hasMod", "p2"),
    Edge("p1", "posted", "pst1"), Edge("p2", "posted", "pst1"), Edge("p2", "posted", "pst2"),
    Edge("pst1", "containedIn", "fo1"))

  test("evalPathFull materializes a two-edge path") {
    val p  = Vector(pe(Vr("x"), "hasMod", Vr("y")), pe(Vr("y"), "posted", Cst("pst1")))
    val r  = PathEval.evalPathFull(p, mats(edges, Seq(p)), new JoinCache(false))
    assert(r.rows.map(_.toVector).toSet == Set(
      Vector("f1", "p1", "pst1"), Vector("f2", "p2", "pst1")))
  }

  test("evalPathFull of a three-edge chain") {
    val p = Vector(
      pe(Vr("x"), "hasMod", Vr("y")), pe(Vr("y"), "posted", Vr("z")), pe(Vr("z"), "containedIn", Vr("w")))
    val r = PathEval.evalPathFull(p, mats(edges, Seq(p)), new JoinCache(false))
    assert(r.rows.map(_.toVector).toSet == Set(
      Vector("f1", "p1", "pst1", "fo1"), Vector("f2", "p2", "pst1", "fo1")))
  }

  test("evalPathFull enforces repeated-variable equality (self-loop)") {
    val loopEdges = Seq(Edge("a", "l", "a"), Edge("a", "l", "b"))
    val p = Vector(pe(Vr("x"), "l", Vr("x")))
    val r = PathEval.evalPathFull(p, mats(loopEdges, Seq(p)), new JoinCache(false))
    assert(r.rows.map(_.toVector).toSet == Set(Vector("a", "a")))
  }

  test("evalPathFull enforces repeated variables across positions (cycle path)") {
    val cyc = Seq(Edge("a", "l", "b"), Edge("b", "l", "a"), Edge("b", "l", "c"))
    val p = Vector(pe(Vr("x"), "l", Vr("y")), pe(Vr("y"), "l", Vr("x")))
    val r = PathEval.evalPathFull(p, mats(cyc, Seq(p)), new JoinCache(false))
    assert(r.rows.map(_.toVector).toSet == Set(Vector("a", "b", "a"), Vector("b", "a", "b")))
  }

  test("evalPathFull returns empty when a view is empty") {
    val p = Vector(pe(Vr("x"), "hasMod", Vr("y")), pe(Vr("y"), "nosuch", Vr("z")))
    val r = PathEval.evalPathFull(p, mats(edges, Seq(p)), new JoinCache(false))
    assert(r.isEmpty)
  }

  test("evalPathDelta finds only matches using the update, at any position") {
    val p = Vector(pe(Vr("x"), "hasMod", Vr("y")), pe(Vr("y"), "posted", Cst("pst1")))
    val fn = mats(edges, Seq(p))
    // update = the posted edge of p2: only the f2 row uses it
    val r1 = PathEval.evalPathDelta(p, fn, new JoinCache(false), Edge("p2", "posted", "pst1"))
    assert(r1.rows.map(_.toVector).toSet == Set(Vector("f2", "p2", "pst1")))
    // update = the hasMod edge of f1: only the f1 row uses it
    val r2 = PathEval.evalPathDelta(p, fn, new JoinCache(false), Edge("f1", "hasMod", "p1"))
    assert(r2.rows.map(_.toVector).toSet == Set(Vector("f1", "p1", "pst1")))
  }

  test("evalPathDelta is empty for an update the path cannot use") {
    val p = Vector(pe(Vr("x"), "hasMod", Vr("y")), pe(Vr("y"), "posted", Cst("pst1")))
    val r = PathEval.evalPathDelta(p, mats(edges, Seq(p)), new JoinCache(false), Edge("p2", "posted", "pst2"))
    assert(r.isEmpty)
  }

  test("evalPathDelta union over all seed positions equals full for single-use updates") {
    val p  = Vector(pe(Vr("x"), "l", Vr("y")), pe(Vr("y"), "l", Vr("z")))
    val es = Seq(Edge("a", "l", "b"), Edge("b", "l", "c"), Edge("c", "l", "d"))
    val fn = mats(es, Seq(p))
    val all = es.flatMap(e => PathEval.evalPathDelta(p, fn, new JoinCache(false), e).rows.map(_.toVector)).toSet
    val full = PathEval.evalPathFull(p, fn, new JoinCache(false)).rows.map(_.toVector).toSet
    assert(all == full)
  }

  test("joinPaths joins two paths on their shared variable") {
    val p1 = Vector(pe(Vr("x"), "hasMod", Vr("y")), pe(Vr("y"), "posted", Cst("pst1")))
    val p2 = Vector(pe(Vr("y"), "posted", Cst("pst2")))
    val fn = mats(edges, Seq(p1, p2))
    val jc = new JoinCache(false)
    val q  = QueryPattern(0, p1 ++ p2)
    val bs = PathEval.joinPaths(q, Vector(p1, p2),
      Vector(PathEval.evalPathFull(p1, fn, jc), PathEval.evalPathFull(p2, fn, jc)))
    // only p2 posted both pst1 and pst2
    assert(bs == Set(Map("x" -> "f2", "y" -> "p2")))
  }

  test("joinPaths with an empty path relation is empty") {
    val p1 = Vector(pe(Vr("x"), "hasMod", Vr("y")))
    val q  = QueryPattern(0, p1)
    assert(PathEval.joinPaths(q, Vector(p1), Vector(new Rel(2))).isEmpty)
  }

  test("joinPaths on disjoint variables forms a cross product") {
    val p1 = Vector(pe(Vr("x"), "hasMod", Vr("y")))
    val p2 = Vector(pe(Vr("z"), "containedIn", Vr("w")))
    val fn = mats(edges, Seq(p1, p2))
    val jc = new JoinCache(false)
    val q  = QueryPattern(0, p1 ++ p2)
    val bs = PathEval.joinPaths(q, Vector(p1, p2),
      Vector(PathEval.evalPathFull(p1, fn, jc), PathEval.evalPathFull(p2, fn, jc)))
    assert(bs.size == 2) // 2 hasMod rows x 1 containedIn row
  }

  test("eqClass maps repeated variables to their first position") {
    val terms = Vector[repro.query.Term](Vr("x"), Vr("y"), Vr("x"), Cst("k"))
    assert(PathEval.eqClass(terms) == Vector(0, 1, 0, 3))
  }

  test("consistent accepts/rejects rows against eq classes") {
    val eq = Vector(0, 1, 0)
    assert(PathEval.consistent(Array("a", "b", "a"), eq))
    assert(!PathEval.consistent(Array("a", "b", "c"), eq))
  }
}
