package repro

import repro.graph.{Edge, GraphStream}
import repro.query.QueryPattern.Binding
import repro.query.{Cst, QueryPattern, Term, Vr}

/** Independent reference evaluator used by unit tests: naive backtracking
  * over the pattern edges in their written order, no planner, no indexes.
  * Deliberately a different code path from every engine under test (and from
  * the GraphDb matcher), so agreement is meaningful.
  */
object BruteForce {

  def bindings(edges: Iterable[Edge], q: QueryPattern): Set[Binding] = {
    val es = edges.toVector

    def resolve(t: Term, b: Binding): Option[String] = t match {
      case Cst(l) => Some(l)
      case Vr(n)  => b.get(n)
    }

    def bind(t: Term, v: String, b: Binding): Option[Binding] = t match {
      case Cst(l) => if (l == v) Some(b) else None
      case Vr(n)  => b.get(n) match {
        case Some(x) => if (x == v) Some(b) else None
        case None    => Some(b + (n -> v))
      }
    }

    def rec(i: Int, b: Binding): Set[Binding] =
      if (i == q.edges.size) Set(b)
      else {
        val pe = q.edges(i)
        es.iterator.filter(_.label == pe.label).flatMap { e =>
          bind(pe.src, e.src, b).flatMap(bind(pe.dst, e.dst, _)).map(rec(i + 1, _)).getOrElse(Set.empty)
        }.toSet
      }

    rec(0, Map.empty)
  }

  /** Early-exit satisfaction check (first embedding wins). */
  def satisfied(edges: Iterable[Edge], q: QueryPattern): Boolean = {
    val es = edges.toVector

    def resolve(t: Term, b: Binding): Option[String] = t match {
      case Cst(l) => Some(l)
      case Vr(n)  => b.get(n)
    }
    def bind(t: Term, v: String, b: Binding): Option[Binding] = t match {
      case Cst(l) => if (l == v) Some(b) else None
      case Vr(n)  => b.get(n) match {
        case Some(x) => if (x == v) Some(b) else None
        case None    => Some(b + (n -> v))
      }
    }
    def rec(i: Int, b: Binding): Boolean =
      i == q.edges.size || {
        val pe = q.edges(i)
        es.exists { e =>
          e.label == pe.label &&
            bind(pe.src, e.src, b).flatMap(bind(pe.dst, e.dst, _)).exists(rec(i + 1, _))
        }
      }
    rec(0, Map.empty)
  }
}

/** Small shared workloads, built once per JVM (suites share the forked JVM). */
object TestWorkloads {
  import repro.datasets.{BioGen, SnbGen, TaxiGen}
  import repro.query.{QueryConfig, QueryGenerator}

  lazy val snbStream: Vector[Edge]  = SnbGen.stream(1500, seed = 7)
  lazy val taxiStream: Vector[Edge] = TaxiGen.stream(1500, seed = 11)
  lazy val bioStream: Vector[Edge]  = BioGen.stream(800, seed = 13)

  lazy val snbAdj  = new GraphStream.Adjacency(snbStream)
  lazy val taxiAdj = new GraphStream.Adjacency(taxiStream)
  lazy val bioAdj  = new GraphStream.Adjacency(bioStream)

  lazy val snbQueries: Vector[QueryPattern] =
    QueryGenerator.generate(snbAdj, QueryConfig(n = 60, avgLen = 4, seed = 1))
  lazy val taxiQueries: Vector[QueryPattern] =
    QueryGenerator.generate(taxiAdj, QueryConfig(n = 60, avgLen = 4, seed = 2))
  lazy val bioQueries: Vector[QueryPattern] =
    QueryGenerator.generate(bioAdj, QueryConfig(n = 40, avgLen = 3, seed = 3))

  val datasets: Seq[(String, () => Vector[Edge], () => Vector[QueryPattern])] = Seq(
    ("snb", () => snbStream, () => snbQueries),
    ("taxi", () => taxiStream, () => taxiQueries),
    ("bio", () => bioStream, () => bioQueries),
  )

  // Smaller prefixes for the cross-engine agreement sweep, where the O(n²)
  // INV baseline replays the whole stream too.
  lazy val crossWorkloads: Seq[(String, Vector[Edge], Vector[QueryPattern])] =
    Seq(
      ("snb", snbStream.take(500), 31L),
      ("taxi", taxiStream.take(500), 32L),
      ("bio", bioStream.take(400), 33L),
    ).map { case (name, stream, seed) =>
      val adj = new GraphStream.Adjacency(stream)
      (name, stream,
        QueryGenerator.generate(adj, QueryConfig(n = 30, avgLen = 4, selectivity = 0.4, seed = seed)))
    }
}
