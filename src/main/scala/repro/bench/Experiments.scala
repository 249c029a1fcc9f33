package repro.bench

import repro.datasets.{BioGen, SnbGen, TaxiGen}
import repro.engine.ContinuousEngine
import repro.graph.{Edge, GraphStream}
import repro.query.{QueryConfig, QueryGenerator, QueryPattern}

import scala.collection.mutable

/** One function per table/figure of the paper's evaluation (§6). Each builds
  * the workload at a scaled-down size (DESIGN.md §2 documents the scaling),
  * runs the algorithms under a time budget, and renders the same rows the
  * paper plots. Bench suites assert the *shape* (who wins, roughly by what
  * factor, where the timeouts land); EXPERIMENTS.md records paper vs measured.
  *
  * Scaling knobs (environment):
  *   REPRO_BENCH_SCALE      multiplies workload sizes (default 1.0)
  *   REPRO_BENCH_BUDGET_MS  per-run answering-time budget (default 30000),
  *                          the stand-in for the paper's 24h threshold
  */
object Experiments {

  lazy val scale: Double   = sys.env.get("REPRO_BENCH_SCALE").map(_.toDouble).getOrElse(1.0)
  lazy val budgetMs: Long  = sys.env.get("REPRO_BENCH_BUDGET_MS").map(_.toLong).getOrElse(30000L)
  private def sc(x: Int): Int = math.max(50, (x * scale).toInt)

  /** Baseline query-set size: the paper's |Q_DB|=5K scaled down. */
  def qdbSize: Int = sc(400)

  final case class Table(title: String, header: Seq[String], rows: Seq[Seq[String]],
                         runs: Seq[Harness.RunResult]) {
    def render(): String = {
      val all = header +: rows
      val w = header.indices.map(c => all.map(_(c).length).max)
      (s"=== $title ===" +:
        all.map(r => r.zipWithIndex.map { case (cell, c) => cell.padTo(w(c), ' ') }.mkString("  ")))
        .mkString("\n")
    }
    def run(algo: String): Harness.RunResult = runs.find(_.algo == algo).get
  }

  // ------------------------------------------------------------ workloads

  private val streamCache = mutable.HashMap.empty[(String, Int), Vector[Edge]]
  def stream(ds: String, n: Int): Vector[Edge] = streamCache.getOrElseUpdate((ds, n), ds match {
    case "snb"  => SnbGen.stream(n)
    case "taxi" => TaxiGen.stream(n)
    case "bio"  => BioGen.stream(n)
  })

  private val queryCache = mutable.HashMap.empty[(String, Int, QueryConfig), Vector[QueryPattern]]
  def queries(ds: String, n: Int, cfg: QueryConfig): Vector[QueryPattern] =
    queryCache.getOrElseUpdate((ds, n, cfg), {
      val adj = new GraphStream.Adjacency(stream(ds, n))
      QueryGenerator.generate(adj, cfg)
    })

  private def checkpointsFor(n: Int, k: Int = 6): Seq[Int] = (1 to k).map(i => n * i / k)

  private def runAll(engines: Seq[() => ContinuousEngine], qs: Seq[QueryPattern],
                     st: Vector[Edge], cps: Seq[Int],
                     budgetMult: Double = 1.0): Seq[Harness.RunResult] =
    engines.map(mk => Harness.run(mk, qs, st, cps, (budgetMs * budgetMult).toLong))

  private def checkpointTable(title: String, runs: Seq[Harness.RunResult], cps: Seq[Int]): Table =
    Table(title,
      "algorithm" +: cps.map(c => s"|G_E|=$c"),
      runs.map(r => r.algo +: Harness.cells(r, cps)),
      runs)

  /** Tables whose x-axis is a workload parameter: one overall-average cell
    * per (algorithm, parameter value).
    */
  private def sweepTable(title: String, xs: Seq[String],
                         mk: String => Seq[Harness.RunResult]): Table = {
    val byX  = xs.map(x => x -> mk(x))
    val runs = byX.flatMap(_._2)
    val algos = byX.head._2.map(_.algo)
    Table(title,
      "algorithm" +: xs,
      algos.zipWithIndex.map { case (a, i) =>
        a +: byX.map { case (_, rs) =>
          val r = rs(i)
          if (r.timedOutAt.isDefined) s"*${r.timedOutAt.get}" else Harness.fmt(r.overallAvgMs)
        }
      },
      runs)
  }

  // ------------------------------------------------------------ SNB (Fig 13)

  /** Fig 13(a): answering time vs graph size, all 7 algorithms. */
  def fig13a(): Table = {
    val n  = sc(6000)
    val st = stream("snb", n)
    val qs = queries("snb", n, QueryConfig(qdbSize))
    checkpointTable(
      s"Fig 13(a) SNB answering time (ms/update), |Q|=$qdbSize, l=5, sigma=25%, o=35%",
      runAll(Harness.allEngines, qs, st, checkpointsFor(n), budgetMult = 2.0), checkpointsFor(n))
  }

  /** Fig 13(b): vary selectivity σ = 10%..30%. */
  def fig13b(): Table = {
    val n  = sc(2000)
    val st = stream("snb", n)
    sweepTable(
      s"Fig 13(b) SNB answering time (ms/update) vs selectivity, |Q|=$qdbSize, |G_E|=$n",
      Seq("10%", "15%", "20%", "25%", "30%"),
      x => {
        val sigma = x.dropRight(1).toInt / 100.0
        runAll(Harness.allEngines, queries("snb", n, QueryConfig(qdbSize, selectivity = sigma)), st, Seq(n))
      })
  }

  /** Fig 13(c): vary |Q_DB| (paper 1K..5K → scaled). */
  def fig13c(): Table = {
    val n  = sc(2000)
    val st = stream("snb", n)
    val sizes = Seq(sc(120), sc(360), sc(600))
    sweepTable(
      s"Fig 13(c) SNB answering time (ms/update) vs |Q_DB|, |G_E|=$n",
      sizes.map(s => s"|Q|=$s"),
      x => runAll(Harness.allEngines, queries("snb", n, QueryConfig(x.drop(4).toInt)), st, Seq(n)))
  }

  /** Fig 13(d): vary average query size ℓ = 3..9. */
  def fig13d(): Table = {
    val n  = sc(2000)
    val st = stream("snb", n)
    sweepTable(
      s"Fig 13(d) SNB answering time (ms/update) vs avg query size, |Q|=$qdbSize, |G_E|=$n",
      Seq("l=3", "l=5", "l=7", "l=9"),
      x => runAll(Harness.allEngines, queries("snb", n, QueryConfig(qdbSize, avgLen = x.drop(2).toInt)), st, Seq(n)))
  }

  /** Fig 13(e): vary query overlap o = 25%..65%. */
  def fig13e(): Table = {
    val n  = sc(2000)
    val st = stream("snb", n)
    sweepTable(
      s"Fig 13(e) SNB answering time (ms/update) vs overlap, |Q|=$qdbSize, |G_E|=$n",
      Seq("25%", "35%", "45%", "55%", "65%"),
      x => {
        val o = x.dropRight(1).toInt / 100.0
        runAll(Harness.allEngines, queries("snb", n, QueryConfig(qdbSize, overlap = o)), st, Seq(n))
      })
  }

  /** Fig 13(f): larger SNB graph (paper 100K→1M); INV/INC expected to time out. */
  def fig13f(): Table = {
    val n  = sc(12000)
    val st = stream("snb", n)
    val qs = queries("snb", n, QueryConfig(qdbSize))
    checkpointTable(
      s"Fig 13(f) SNB large graph answering time (ms/update), |Q|=$qdbSize",
      runAll(Harness.allEngines, qs, st, checkpointsFor(n), budgetMult = 2.0), checkpointsFor(n))
  }

  /** Fig 14: largest SNB graph (paper 1M→10M); TRIC, TRIC+, Neo4j only. */
  def fig14(): Table = {
    val n  = sc(16000)
    val st = stream("snb", n)
    val qs = queries("snb", n, QueryConfig(qdbSize))
    val engines = Seq(Harness.allEngines.head, Harness.allEngines(1), Harness.allEngines.last)
    checkpointTable(
      s"Fig 14 SNB XL graph answering time (ms/update), |Q|=$qdbSize (TRIC, TRIC+, Neo4j)",
      runAll(engines, qs, st, checkpointsFor(n), budgetMult = 3.0), checkpointsFor(n))
  }

  /** Fig 15: query insertion time per batch as |Q_DB| grows. */
  def fig15(): Table = {
    val n  = sc(4000)
    val batch = sc(150)
    val qs = queries("snb", n, QueryConfig(5 * batch))
    val batches = qs.grouped(batch).toVector
    val rows = Harness.allEngines.map { mk =>
      val e = mk()
      val times = batches.map { b =>
        val t0 = System.nanoTime()
        e.indexAll(b)
        (System.nanoTime() - t0) / 1e6
      }
      e.name +: times.map(Harness.fmt)
    }
    Table(
      s"Fig 15 SNB query insertion time (ms per $batch queries)",
      "algorithm" +: (1 to batches.size).map(i => s"|Q|=${i * batch}"),
      rows, Seq.empty)
  }

  // ------------------------------------------------- NYC + BioGRID (Fig 16)

  /** Fig 16(a): NYC taxi answering time; INV/INC expected to time out. */
  def fig16a(): Table = {
    val n  = sc(6000)
    val st = stream("taxi", n)
    val qs = queries("taxi", n, QueryConfig(qdbSize))
    checkpointTable(
      s"Fig 16(a) TAXI answering time (ms/update), |Q|=$qdbSize",
      runAll(Harness.allEngines, qs, st, checkpointsFor(n), budgetMult = 2.0), checkpointsFor(n))
  }

  /** Fig 16(b): BioGRID stress test, small graph; INV/INC expected to time out. */
  def fig16b(): Table = {
    val n  = sc(1000)
    val st = stream("bio", n)
    val qs = queries("bio", n, QueryConfig(qdbSize))
    checkpointTable(
      s"Fig 16(b) BioGRID answering time (ms/update), |Q|=$qdbSize (stress: single label)",
      runAll(Harness.allEngines, qs, st, checkpointsFor(n), budgetMult = 2.0), checkpointsFor(n))
  }

  /** Fig 16(c): BioGRID larger graph; TRIC, TRIC+, Neo4j. */
  def fig16c(): Table = {
    val n  = sc(1600)
    val st = stream("bio", n)
    val qs = queries("bio", n, QueryConfig(qdbSize))
    val engines = Seq(Harness.allEngines.head, Harness.allEngines(1), Harness.allEngines.last)
    checkpointTable(
      s"Fig 16(c) BioGRID large answering time (ms/update), |Q|=$qdbSize (TRIC, TRIC+, Neo4j)",
      runAll(engines, qs, st, checkpointsFor(n), budgetMult = 3.0), checkpointsFor(n))
  }

  // ------------------------------------------------------------ Table 1

  /** Table 1: memory usage per algorithm × dataset after full replay. */
  def table1(): Table = {
    val configs = Seq(("snb", sc(3000)), ("taxi", sc(3000)), ("bio", sc(800)))
    val byDs = configs.map { case (ds, n) =>
      val st = stream(ds, n)
      val qs = queries(ds, n, QueryConfig(qdbSize))
      ds -> runAll(Harness.allEngines, qs, st, Seq(n))
    }
    val algos = byDs.head._2.map(_.algo)
    Table(
      s"Table 1 memory usage (MB), |Q|=$qdbSize after full replay",
      "algorithm" +: configs.map { case (ds, n) => s"$ds(|G|=$n)" },
      algos.zipWithIndex.map { case (a, i) =>
        // a timed-out run's memory is reported at the edge count it reached,
        // like the paper's superscript annotations in Table 1
        a +: byDs.map { case (_, rs) =>
          val r = rs(i)
          f"${r.memBytes / 1048576.0}%.1fMB" + r.timedOutAt.map(at => s"@$at").getOrElse("")
        }
      },
      byDs.flatMap(_._2))
  }
}
