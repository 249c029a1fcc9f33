package repro.jobs

import repro.bench.{Experiments, Harness}
import repro.query.QueryConfig

/** Calibration probe: per-update answering times of all engines at a small
  * scale, to sanity-check bench sizing. Not part of the table reproductions.
  */
object Probe {
  def main(args: Array[String]): Unit = {
    val n  = args.headOption.map(_.toInt).getOrElse(3000)
    val nq = args.lift(1).map(_.toInt).getOrElse(300)
    val ds = args.lift(2).getOrElse("snb")
    val st = Experiments.stream(ds, n)
    val qs = Experiments.queries(ds, n, QueryConfig(nq))
    println(s"probe: ds=$ds |G_E|=$n |Q|=$nq budget=${Experiments.budgetMs}ms")
    for (mk <- Harness.allEngines) {
      val t0 = System.nanoTime()
      val r  = Harness.run(mk, qs, st, Seq(n / 2, n), Experiments.budgetMs)
      val wall = (System.nanoTime() - t0) / 1e9
      println(f"${r.algo}%-6s idx=${r.indexMs}%8.1fms " +
        s"cps=${r.checkpoints.map(c => f"${c.avgMs}%.3f").mkString(",")} " +
        s"timeout=${r.timedOutAt} sat=${r.satisfied} mem=${r.memBytes / 1048576}MB " +
        f"wall=$wall%.1fs")
    }
  }
}
