package repro.datasets

import org.scalatest.funsuite.AnyFunSuite
import repro.TestWorkloads
import repro.graph.GraphStream

/** Unit tests for the three synthetic stream generators. */
class DatasetsSpec extends AnyFunSuite {

  for ((name, gen) <- Seq[(String, (Int, Long) => Vector[repro.graph.Edge])](
         ("SnbGen", SnbGen.stream), ("TaxiGen", TaxiGen.stream), ("BioGen", BioGen.stream))) {

    test(s"$name produces exactly the requested number of unique edges") {
      val s = gen(800, 1)
      assert(s.size == 800)
      assert(s.distinct.size == 800)
    }

    test(s"$name is deterministic in (n, seed) and sensitive to seed") {
      assert(gen(300, 5) == gen(300, 5))
      assert(gen(300, 5) != gen(300, 6))
    }

    if (name != "TaxiGen") { // taxi entity pools scale with n by design
      test(s"$name streams are prefix-stable when the size grows") {
        assert(gen(500, 2) == gen(800, 2).take(500))
      }

      // taxi ride graphs are DAGs (like the real DEBS'15 event data); cycle
      // queries there fall back to chains in the generator
      test(s"$name final graph contains directed cycles (cycle queries samplable)") {
        val adj = new GraphStream.Adjacency(gen(1200, 3))
        // look for any length-3..4 closed walk
        val found = adj.edges.take(600).exists { e0 =>
          adj.outOf(e0.dst).exists(e1 =>
            adj.outOf(e1.dst).exists(e2 => e2.dst == e0.src ||
              adj.outOf(e2.dst).exists(_.dst == e0.src)))
        }
        assert(found, s"$name graph has no short cycles")
      }
    }
  }

  test("SnbGen uses the social-network label vocabulary") {
    val labels = TestWorkloads.snbStream.map(_.label).toSet
    assert(Set("knows", "posted", "likes", "hasModerator", "hasMember",
               "containedIn", "hasCreator", "replyOf", "locatedIn").subsetOf(labels))
  }

  test("SnbGen grows person/forum/post populations") {
    val s = TestWorkloads.snbStream
    assert(s.exists(_.src.startsWith("po")))
    assert(s.exists(_.src.startsWith("f")))
    assert(s.count(_.label == "knows") > 50)
  }

  test("TaxiGen has few labels over a heavily reused vertex population") {
    val s = TestWorkloads.taxiStream
    assert(s.map(_.label).toSet.size <= 9)
    val zones = s.filter(_.label == "pickup").map(_.dst).toSet
    assert(zones.size <= 60) // small shared zone population
    assert(s.count(_.label == "pickup") > zones.size) // zones are reused
  }

  test("TaxiGen links consecutive rides of the same medallion") {
    assert(TestWorkloads.taxiStream.count(_.label == "follows") > 10)
  }

  test("BioGen is single-label, single-vertex-type (the paper's stress property)") {
    val s = TestWorkloads.bioStream
    assert(s.map(_.label).toSet == Set("interacts"))
    assert(s.forall(e => e.src.startsWith("pr") && e.dst.startsWith("pr")))
    assert(s.forall(e => e.src != e.dst))
  }

  test("BioGen shows hub structure (preferential attachment)") {
    val adj = new GraphStream.Adjacency(TestWorkloads.bioStream)
    val degrees = adj.vertices.map(v => adj.outOf(v).size + adj.inOf(v).size)
    assert(degrees.max > 5 * (degrees.sum.toDouble / degrees.size), "no hubs found")
  }
}
