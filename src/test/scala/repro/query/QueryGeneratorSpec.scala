package repro.query

import org.scalatest.funsuite.AnyFunSuite
import repro.BruteForce
import repro.TestWorkloads
import repro.graph.GraphStream

/** Unit tests for the query-workload generator (paper §6.1 knobs). */
class QueryGeneratorSpec extends AnyFunSuite {

  private lazy val adj = TestWorkloads.snbAdj

  private def gen(cfg: QueryConfig): Vector[QueryPattern] = QueryGenerator.generate(adj, cfg)

  test("generates exactly n queries with unique sequential ids") {
    val qs = gen(QueryConfig(n = 50, seed = 9))
    assert(qs.size == 50)
    assert(qs.map(_.id) == (0 until 50))
  }

  test("selectivity is exact: σ·n queries satisfied by the final graph, rest never") {
    for (sigma <- Seq(0.1, 0.25, 0.5)) {
      val qs = gen(QueryConfig(n = 40, avgLen = 4, selectivity = sigma, seed = 10))
      val sat = qs.count(q => BruteForce.satisfied(adj.edges, q))
      assert(sat == math.round(40 * sigma).toInt, s"σ=$sigma")
    }
  }

  test("unsatisfied queries contain a poisoned literal absent from the graph") {
    val qs = gen(QueryConfig(n = 30, selectivity = 0.5, seed = 11))
    val verts = adj.vertices.toSet
    val unsat = qs.filterNot(q => BruteForce.satisfied(adj.edges, q))
    assert(unsat.nonEmpty)
    unsat.foreach { q =>
      val lits = q.terms.collect { case Cst(l) => l }
      assert(lits.exists(l => l.startsWith("zz") && !verts.contains(l)), q.show)
    }
  }

  test("average query size tracks ℓ") {
    for (l <- Seq(3, 5, 7)) {
      val qs = gen(QueryConfig(n = 60, avgLen = l, seed = 12))
      val avg = qs.map(_.edges.size).sum.toDouble / qs.size
      assert(math.abs(avg - l) < 1.5, s"ℓ=$l avg=$avg")
    }
  }

  test("generation is deterministic in the seed") {
    assert(gen(QueryConfig(n = 25, seed = 33)) == gen(QueryConfig(n = 25, seed = 33)))
    assert(gen(QueryConfig(n = 25, seed = 33)) != gen(QueryConfig(n = 25, seed = 34)))
  }

  test("variables are consistent: one distinct variable per generalized vertex") {
    val qs = gen(QueryConfig(n = 40, seed = 13))
    qs.foreach { q =>
      // no variable name is used for two different structural roles: rebuild
      // the term list and check each var name appears as one term only
      val varTerms = q.terms.collect { case v: Vr => v }
      assert(varTerms.distinct.size == varTerms.size)
    }
  }

  test("higher overlap produces more shared generic sub-paths") {
    def sharing(o: Double): Double = {
      val qs = gen(QueryConfig(n = 80, overlap = o, seed = 14))
      val pathKeys = qs.flatMap(q => CoveringPaths.cover(q).map(Generic.ofPath))
      pathKeys.size.toDouble / pathKeys.distinct.size
    }
    assert(sharing(0.65) > sharing(0.0))
  }

  test("query classes include chains, stars and cycles") {
    val qs = gen(QueryConfig(n = 90, avgLen = 4, selectivity = 1.0, seed = 15))
    def isStar(q: QueryPattern) =
      q.edges.size >= 2 && (q.edges.forall(_.src == q.edges.head.src) || q.edges.forall(_.dst == q.edges.head.dst))
    def isCycle(q: QueryPattern) = {
      val paths = CoveringPaths.cover(q)
      paths.size == 1 && paths.head.head.src == paths.head.last.dst && q.edges.size >= 3
    }
    assert(qs.exists(isStar), "no stars generated")
    assert(qs.exists(isCycle), "no cycles generated")
    assert(qs.exists(q => !isStar(q) && !isCycle(q)), "no chains generated")
  }

  test("satisfied queries are satisfied on other datasets too (taxi, bio)") {
    for ((name, adjx) <- Seq(("taxi", TestWorkloads.taxiAdj), ("bio", TestWorkloads.bioAdj))) {
      val qs = QueryGenerator.generate(adjx, QueryConfig(n = 20, avgLen = 3, selectivity = 0.5, seed = 21))
      val sat = qs.count(q => BruteForce.satisfied(adjx.edges, q))
      assert(sat == 10, s"$name: $sat")
    }
  }

  test("generator refuses an empty graph") {
    intercept[IllegalArgumentException] {
      QueryGenerator.generate(new GraphStream.Adjacency(Vector.empty), QueryConfig(n = 1))
    }
  }
}
