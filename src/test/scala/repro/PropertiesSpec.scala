package repro

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite
import repro.core.TricEngine
import repro.graph.Edge
import repro.inv.InvEngine
import repro.query._

/** ScalaCheck property sweep over randomly generated patterns and streams:
  * structural invariants of the covering-path decomposition and end-to-end
  * agreement of the engines with the brute-force reference.
  */
class PropertiesSpec extends AnyFunSuite {

  private def check(name: String, prop: Prop, min: Int = 60): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(min), prop)
    assert(res.passed, s"$name: $res")
  }

  private val genTerm: Gen[Term] = Gen.oneOf(
    Gen.choose(0, 5).map(i => Vr(s"v$i")),
    Gen.choose(0, 5).map(i => Cst(s"k$i")))

  private val genPattern: Gen[QueryPattern] = for {
    n     <- Gen.choose(1, 7)
    edges <- Gen.listOfN(n, for {
      s <- genTerm; l <- Gen.choose(0, 2).map(i => s"l$i"); t <- genTerm
    } yield PatternEdge(s, l, t))
  } yield QueryPattern(0, edges.toVector.distinct)

  private val genStream: Gen[Vector[Edge]] = for {
    n  <- Gen.choose(1, 60)
    es <- Gen.listOfN(n, for {
      s <- Gen.choose(0, 7).map(i => s"k$i")
      l <- Gen.choose(0, 2).map(i => s"l$i")
      t <- Gen.choose(0, 7).map(i => s"k$i")
    } yield Edge(s, l, t))
  } yield es.toVector.distinct

  test("property: covering paths cover every edge and vertex of any pattern") {
    check("cover", Prop.forAll(genPattern) { q =>
      val paths = CoveringPaths.cover(q)
      paths.flatten.toSet == q.edges.toSet &&
        paths.flatMap(p => p.flatMap(e => Seq(e.src, e.dst))).toSet == q.terms.toSet
    })
  }

  test("property: covering paths are connected chains in the pattern") {
    check("connected", Prop.forAll(genPattern) { q =>
      CoveringPaths.cover(q).forall(p =>
        p.size < 2 || p.sliding(2).forall { case Vector(a, b) => a.dst == b.src; case _ => true })
    })
  }

  test("property: genericization preserves path length and literal positions") {
    check("generic", Prop.forAll(genPattern) { q =>
      CoveringPaths.cover(q).forall { p =>
        val gs = Generic.ofPath(p)
        gs.size == p.size && gs.zip(p).forall { case (g, pe) =>
          g.label == pe.label &&
            g.src.isDefined == !pe.src.isVar && g.dst.isDefined == !pe.dst.isVar
        }
      }
    })
  }

  test("property: every stream edge matches all four of its generalizations") {
    check("generalize", Prop.forAll(genStream) { es =>
      es.forall(e => Generic.generalizations(e).forall(_.matches(e)))
    })
  }

  test("property: TRIC replay equals brute force on random streams and patterns") {
    check("tric-vs-brute", Prop.forAll(genPattern, genStream) { (q, es) =>
      val t = new TricEngine(false)
      t.indexQuery(q)
      es.foreach(t.onUpdate)
      t.bindings(0) == BruteForce.bindings(es, q)
    }, min = 40)
  }

  test("property: TRIC+ replay equals brute force on random streams and patterns") {
    check("tricplus-vs-brute", Prop.forAll(genPattern, genStream) { (q, es) =>
      val t = new TricEngine(true)
      t.indexQuery(q)
      es.foreach(t.onUpdate)
      t.bindings(0) == BruteForce.bindings(es, q)
    }, min = 40)
  }

  test("property: INC replay equals brute force on random streams and patterns") {
    check("inc-vs-brute", Prop.forAll(genPattern, genStream) { (q, es) =>
      val e = new InvEngine(true, false)
      e.indexQuery(q)
      es.foreach(e.onUpdate)
      e.bindings(0) == BruteForce.bindings(es, q)
    }, min = 40)
  }

  test("property: INV replay equals brute force on random streams and patterns") {
    check("inv-vs-brute", Prop.forAll(genPattern, genStream) { (q, es) =>
      val e = new InvEngine(false, false)
      e.indexQuery(q)
      es.foreach(e.onUpdate)
      e.bindings(0) == BruteForce.bindings(es, q)
    }, min = 40)
  }

  test("property: satisfaction is monotone — once satisfied, always satisfied") {
    check("monotone", Prop.forAll(genPattern, genStream) { (q, es) =>
      val t = new TricEngine(false)
      t.indexQuery(q)
      var wasSat = false
      es.forall { e =>
        t.onUpdate(e)
        val sat = t.satisfied.contains(0)
        val ok = !wasSat || sat
        wasSat = sat
        ok
      }
    }, min = 40)
  }
}
