package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Experiments
import repro.core.TricEngine
import repro.query.QueryConfig
import repro.stream.StreamingEval

/** Structured Streaming entrypoint: continuous multi-query evaluation of an
  * SNB-like update stream through the shared TRIC+ operator, printing match
  * events as the paper's subscriber notifications.
  *
  * Usage: spark-submit --class repro.jobs.StreamingDemo repro.jar [nEdges] [nQueries]
  */
object StreamingDemo {
  def main(args: Array[String]): Unit = {
    val n  = args.headOption.map(_.toInt).getOrElse(3000)
    val nq = args.lift(1).map(_.toInt).getOrElse(200)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-streaming")
      .getOrCreate()

    val stream  = Experiments.stream("snb", n)
    val queries = Experiments.queries("snb", n, QueryConfig(nq))
    val engine  = new TricEngine(caching = true)

    val events = StreamingEval.run(spark, engine, queries, stream, batchSize = 500)
    println(s"stream of $n updates against $nq continuous queries:")
    println(s"  match notifications emitted: ${events.size}")
    println(s"  distinct queries satisfied:  ${engine.satisfied.size}")
    events.take(10).foreach(e => println(s"  e.g. update #${e.seq} satisfied query ${e.qid}"))
    spark.stop()
  }
}
