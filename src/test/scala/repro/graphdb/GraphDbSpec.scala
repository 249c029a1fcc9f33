package repro.graphdb

import org.scalatest.funsuite.AnyFunSuite
import repro.BruteForce
import repro.graph.Edge
import repro.query.{Cst, PatternEdge, QueryPattern, Vr}

/** Unit tests for the Neo4j-substitute graph store, matcher and engine. */
class GraphDbSpec extends AnyFunSuite {

  private def v(n: String) = Vr(n)
  private def c(l: String) = Cst(l)
  private def pe(s: repro.query.Term, l: String, t: repro.query.Term) = PatternEdge(s, l, t)

  test("store indexes edges by source, target and label; dedupes") {
    val s = new GraphStore
    assert(s.add(Edge("a", "x", "b")))
    assert(!s.add(Edge("a", "x", "b")))
    assert(s.add(Edge("a", "y", "c")))
    assert(s.outOf("a").map(_.label).toSet == Set("x", "y"))
    assert(s.inOf("b").map(_.src) == Seq("a"))
    assert(s.ofLabel("x").size == 1)
    assert(s.contains(Edge("a", "x", "b")) && !s.contains(Edge("a", "x", "c")))
    assert(s.edgeCount == 2)
  }

  test("matcher finds chain embeddings") {
    val s = new GraphStore
    Seq(Edge("a", "k", "b"), Edge("b", "p", "c"), Edge("a", "k", "d")).foreach(s.add)
    val q = QueryPattern(1, Vector(pe(v("x"), "k", v("y")), pe(v("y"), "p", v("z"))))
    assert(Matcher.matchPattern(s, q) == Set(Map("x" -> "a", "y" -> "b", "z" -> "c")))
  }

  test("matcher honours literals and repeated variables") {
    val s = new GraphStore
    Seq(Edge("a", "k", "b"), Edge("b", "k", "a"), Edge("b", "k", "c")).foreach(s.add)
    val cyc = QueryPattern(1, Vector(pe(v("x"), "k", v("y")), pe(v("y"), "k", v("x"))))
    assert(Matcher.matchPattern(s, cyc) == Set(
      Map("x" -> "a", "y" -> "b"), Map("x" -> "b", "y" -> "a")))
    val lit = QueryPattern(2, Vector(pe(c("b"), "k", v("y"))))
    assert(Matcher.matchPattern(s, lit) == Set(Map("y" -> "a"), Map("y" -> "c")))
  }

  test("planner puts literal-anchored edges before unconstrained ones") {
    val s = new GraphStore
    (0 until 50).foreach(i => s.add(Edge(s"u$i", "k", s"w$i")))
    s.add(Edge("hub", "p", "x1"))
    val q = QueryPattern(1, Vector(pe(v("a"), "k", v("b")), pe(c("hub"), "p", v("c"))))
    val order = Matcher.planOrder(s, q.edges)
    assert(order.head.label == "p") // anchored at literal "hub": 1 candidate vs 50
  }

  test("matcher agrees with brute force on randomized graphs") {
    val rng = new scala.util.Random(23)
    for (trial <- 0 until 10) {
      val s = new GraphStore
      val es = Vector.tabulate(60)(_ => Edge(s"n${rng.nextInt(10)}", s"l${rng.nextInt(3)}", s"n${rng.nextInt(10)}"))
      es.foreach(s.add)
      val q = QueryPattern(trial, Vector(
        pe(v("x"), s"l${trial % 3}", v("y")), pe(v("y"), s"l${(trial + 1) % 3}", v("z"))))
      assert(Matcher.matchPattern(s, q) == BruteForce.bindings(es.distinct, q), s"trial $trial")
    }
  }

  test("matchAnchored finds exactly the embeddings using the anchored edge") {
    val s = new GraphStore
    Seq(Edge("a", "k", "b"), Edge("b", "p", "c"), Edge("x", "k", "y"), Edge("y", "p", "z")).foreach(s.add)
    val q = QueryPattern(1, Vector(pe(v("u"), "k", v("w")), pe(v("w"), "p", v("t"))))
    // anchor edge 0 at (a,k,b): only the a-b-c embedding
    val bs = Matcher.matchAnchored(s, q, 0, Map("u" -> "a", "w" -> "b"))
    assert(bs == Set(Map("u" -> "a", "w" -> "b", "t" -> "c")))
    // anchored results union over anchors equals the full matcher
    val all = (0 until 2).flatMap { i =>
      s.ofLabel(q.edges(i).label).flatMap { e =>
        val b0 = Map(q.edges(i).src.asInstanceOf[Vr].name -> e.src,
                     q.edges(i).dst.asInstanceOf[Vr].name -> e.dst)
        Matcher.matchAnchored(s, q, i, b0)
      }
    }.toSet
    assert(all == Matcher.matchPattern(s, q))
  }

  test("engine marks queries as updates complete their patterns") {
    val e = new GraphDbEngine
    e.indexQuery(QueryPattern(1, Vector(pe(v("x"), "k", v("y")), pe(v("y"), "p", c("t1")))))
    assert(e.onUpdate(Edge("a", "k", "b")).isEmpty)
    assert(e.onUpdate(Edge("b", "p", "t1")) == Set(1))
    assert(e.bindings(1) == Set(Map("x" -> "a", "y" -> "b")))
  }

  test("engine only re-executes affected queries") {
    val e = new GraphDbEngine
    e.indexQuery(QueryPattern(1, Vector(pe(v("x"), "k", v("y")))))
    e.indexQuery(QueryPattern(2, Vector(pe(v("x"), "p", v("y")))))
    assert(e.onUpdate(Edge("a", "k", "b")) == Set(1))
    assert(e.onUpdate(Edge("a", "p", "b")) == Set(2))
    assert(e.satisfied == Set(1, 2))
  }

  test("variable-free pattern matches as a boolean") {
    val e = new GraphDbEngine
    e.indexQuery(QueryPattern(5, Vector(pe(c("a"), "k", c("b")))))
    assert(e.onUpdate(Edge("a", "k", "c")).isEmpty)
    assert(e.onUpdate(Edge("a", "k", "b")) == Set(5))
    assert(e.bindings(5) == Set(Map.empty[String, String]))
  }
}
