package repro.bench

/** Fig 13(a): SNB answering time vs graph size, all seven algorithms.
  * Paper shape: TRIC/TRIC+ lowest by ~2 orders of magnitude vs INV/INC;
  * caching variants beat their non-caching counterparts; Neo4j in between.
  */
class T13aGraphSizeBench extends BenchSpec {
  private lazy val t = record("fig13a", Experiments.fig13a())

  test("Fig 13(a) renders all seven algorithms") {
    assert(t.rows.map(_.head) == Seq("TRIC", "TRIC+", "INV", "INV+", "INC", "INC+", "Neo4j"))
  }
  test("Fig 13(a) TRIC beats INV and Neo4j (paper: 99.15% / 91.86% faster)") {
    assertFaster(t, "TRIC", "INV")
    assertFaster(t, "TRIC", "Neo4j")
  }
  test("Fig 13(a) TRIC+ beats INV+ and Neo4j (paper: 99.62% / 96.74% faster)") {
    assertFaster(t, "TRIC+", "INV+")
    assertFaster(t, "TRIC+", "Neo4j")
  }
  test("Fig 13(a) TRIC+ vs INV+ is a large factor (paper ~260x; expect >=3x here)") {
    assert(speedup(t, "TRIC+", "INV+") >= 3.0 || t.run("INV+").timedOutAt.isDefined)
  }
  test("Fig 13(a) INC beats INV (paper: 54.33% faster)") {
    assertFaster(t, "INC", "INV")
  }
  test("Fig 13(a) TRIC and TRIC+ process the whole stream (no timeout)") {
    assert(t.run("TRIC").timedOutAt.isEmpty)
    assert(t.run("TRIC+").timedOutAt.isEmpty)
  }
}

/** Fig 13(b): selectivity sweep σ=10%..30%. TRIC variants stay fastest. */
class T13bSelectivityBench extends BenchSpec {
  private lazy val t = record("fig13b", Experiments.fig13b())

  test("Fig 13(b) renders a 5-point selectivity sweep") {
    assert(t.header.size == 6)
    assert(t.rows.size == 7)
  }
  test("Fig 13(b) TRIC+ beats INV+ at every selectivity") {
    val groups = t.runs.grouped(7).toSeq // per sweep point
    groups.zipWithIndex.foreach { case (rs, x) =>
      val tric = rs.find(_.algo == "TRIC+").get
      val inv  = rs.find(_.algo == "INV+").get
      assert(fasterOrOutlasts(tric, inv), s"point $x")
    }
  }
  test("Fig 13(b) TRIC beats INV at every selectivity") {
    val groups = t.runs.grouped(7).toSeq
    groups.zipWithIndex.foreach { case (rs, x) =>
      assert(fasterOrOutlasts(rs.find(_.algo == "TRIC").get, rs.find(_.algo == "INV").get), s"point $x")
    }
  }
}

/** Fig 13(c): |Q_DB| sweep. All algorithms grow with the query count; TRIC
  * variants stay fastest throughout.
  */
class T13cQdbSizeBench extends BenchSpec {
  private lazy val t = record("fig13c", Experiments.fig13c())

  test("Fig 13(c) renders a 3-point query-database sweep") {
    assert(t.header.size == 4)
    assert(t.rows.size == 7)
  }
  test("Fig 13(c) TRIC+ beats INV+ at every |Q_DB|") {
    t.runs.grouped(7).zipWithIndex.foreach { case (rs, x) =>
      assert(fasterOrOutlasts(rs.find(_.algo == "TRIC+").get, rs.find(_.algo == "INV+").get), s"point $x")
    }
  }
  test("Fig 13(c) TRIC beats INV at every |Q_DB|") {
    t.runs.grouped(7).zipWithIndex.foreach { case (rs, x) =>
      assert(fasterOrOutlasts(rs.find(_.algo == "TRIC").get, rs.find(_.algo == "INV").get), s"point $x")
    }
  }
}

/** Fig 13(d): average query size sweep ℓ=3..9. Answering time grows with ℓ
  * for everyone; TRIC variants stay fastest.
  */
class T13dQuerySizeBench extends BenchSpec {
  private lazy val t = record("fig13d", Experiments.fig13d())

  test("Fig 13(d) renders a 4-point query-size sweep") {
    assert(t.header.size == 5)
    assert(t.rows.size == 7)
  }
  test("Fig 13(d) TRIC+ beats INV+ at every query size") {
    t.runs.grouped(7).zipWithIndex.foreach { case (rs, x) =>
      assert(fasterOrOutlasts(rs.find(_.algo == "TRIC+").get, rs.find(_.algo == "INV+").get), s"point $x")
    }
  }
  test("Fig 13(d) TRIC beats INV at every query size") {
    t.runs.grouped(7).zipWithIndex.foreach { case (rs, x) =>
      assert(fasterOrOutlasts(rs.find(_.algo == "TRIC").get, rs.find(_.algo == "INV").get), s"point $x")
    }
  }
}

/** Fig 13(e): overlap sweep o=25%..65%. Higher overlap favours clustering. */
class T13eOverlapBench extends BenchSpec {
  private lazy val t = record("fig13e", Experiments.fig13e())

  test("Fig 13(e) renders a 5-point overlap sweep") {
    assert(t.header.size == 6)
    assert(t.rows.size == 7)
  }
  test("Fig 13(e) TRIC+ beats INV+ at every overlap") {
    t.runs.grouped(7).zipWithIndex.foreach { case (rs, x) =>
      assert(fasterOrOutlasts(rs.find(_.algo == "TRIC+").get, rs.find(_.algo == "INV+").get), s"point $x")
    }
  }
  test("Fig 13(e) TRIC beats INV at every overlap") {
    t.runs.grouped(7).zipWithIndex.foreach { case (rs, x) =>
      assert(fasterOrOutlasts(rs.find(_.algo == "TRIC").get, rs.find(_.algo == "INV").get), s"point $x")
    }
  }
}

/** Fig 13(f): larger SNB graph. Paper shape: INV/INV+ and INC/INC+ fail to
  * finish within the threshold (asterisks); TRIC/TRIC+ stay fastest.
  */
class T13fLargeGraphBench extends BenchSpec {
  private lazy val t = record("fig13f", Experiments.fig13f())

  test("Fig 13(f) TRIC and TRIC+ outlast every inverted-index baseline") {
    for (slow <- Seq("INV", "INV+", "INC", "INC+")) {
      assertFaster(t, "TRIC", slow)
      assertFaster(t, "TRIC+", slow)
    }
  }
  test("Fig 13(f) the INV family hits the execution-time threshold (paper: *210K/*310K)") {
    assert(Seq("INV", "INV+").exists(a => t.run(a).timedOutAt.isDefined),
      "expected INV/INV+ to time out on the large graph")
  }
  test("Fig 13(f) TRIC+ beats Neo4j (paper: 92.86% faster)") {
    assertFaster(t, "TRIC+", "Neo4j")
  }
}

/** Fig 14: the largest SNB graph, TRIC/TRIC+/Neo4j only. Paper shape: only
  * TRIC+ completes; TRIC and Neo4j hit the threshold (asterisks).
  */
class T14XLGraphBench extends BenchSpec {
  private lazy val t = record("fig14", Experiments.fig14())

  test("Fig 14 runs exactly TRIC, TRIC+ and Neo4j") {
    assert(t.rows.map(_.head).toSet == Set("TRIC", "TRIC+", "Neo4j"))
  }
  test("Fig 14 TRIC+ outlasts TRIC (paper: TRIC times out at 5.47M of 10M)") {
    assertFaster(t, "TRIC+", "TRIC")
  }
  test("Fig 14 TRIC+ outlasts Neo4j (paper: Neo4j times out at 4.3M of 10M)") {
    assertFaster(t, "TRIC+", "Neo4j")
  }
}

/** Fig 15: query insertion time per batch while |Q_DB| grows. Indexing is
  * cheap for every algorithm and not the critical dimension (paper §6.2).
  */
class T15IndexingBench extends BenchSpec {
  private lazy val t = record("fig15", Experiments.fig15())

  test("Fig 15 renders five insertion batches for all seven algorithms") {
    assert(t.rows.size == 7)
    assert(t.header.size == 6)
  }
  test("Fig 15 insertion stays in the millisecond range per batch") {
    // every cell parses as a number (no timeouts in indexing) and is sane
    t.rows.foreach { r =>
      r.tail.foreach { cell =>
        val v = cell.toDouble
        assert(v >= 0 && v < 60000, s"${r.head}: $cell")
      }
    }
  }
}
