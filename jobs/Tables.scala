package repro.jobs

import repro.bench.Experiments

/** One spark-submit entrypoint per reproduced table/figure (DESIGN.md §4).
  *
  * Usage:  spark-submit --class repro.jobs.<Name> repro.jar
  * Knobs:  REPRO_BENCH_SCALE (default 1.0), REPRO_BENCH_BUDGET_MS (30000).
  * Each prints the table to stdout in the same row layout the paper plots.
  */
object T13a { def main(args: Array[String]): Unit = println(Experiments.fig13a().render()) }
object T13b { def main(args: Array[String]): Unit = println(Experiments.fig13b().render()) }
object T13c { def main(args: Array[String]): Unit = println(Experiments.fig13c().render()) }
object T13d { def main(args: Array[String]): Unit = println(Experiments.fig13d().render()) }
object T13e { def main(args: Array[String]): Unit = println(Experiments.fig13e().render()) }
object T13f { def main(args: Array[String]): Unit = println(Experiments.fig13f().render()) }
object T14  { def main(args: Array[String]): Unit = println(Experiments.fig14().render()) }
object T15  { def main(args: Array[String]): Unit = println(Experiments.fig15().render()) }
object T16a { def main(args: Array[String]): Unit = println(Experiments.fig16a().render()) }
object T16b { def main(args: Array[String]): Unit = println(Experiments.fig16b().render()) }
object T16c { def main(args: Array[String]): Unit = println(Experiments.fig16c().render()) }
object Table1 { def main(args: Array[String]): Unit = println(Experiments.table1().render()) }

/** Run every table in sequence (the full evaluation). */
object AllTables {
  def main(args: Array[String]): Unit = {
    Seq(
      Experiments.fig13a(), Experiments.fig13b(), Experiments.fig13c(),
      Experiments.fig13d(), Experiments.fig13e(), Experiments.fig13f(),
      Experiments.fig14(), Experiments.fig15(),
      Experiments.fig16a(), Experiments.fig16b(), Experiments.fig16c(),
      Experiments.table1(),
    ).foreach(t => println(t.render() + "\n"))
  }
}
