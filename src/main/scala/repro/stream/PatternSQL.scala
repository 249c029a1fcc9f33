package repro.stream

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types.{StringType, StructField, StructType}
import repro.graph.Edge
import repro.query.QueryPattern.Binding
import repro.query.{Cst, QueryPattern, Vr}

/** Compile a query graph pattern to SQL over an `edges(src, label, dst)`
  * table: one table alias per pattern edge, literal vertices as equality
  * predicates, repeated variables as join predicates, `SELECT DISTINCT` over
  * one representative column per variable.
  *
  * The same SQL text runs on Spark (Catalyst multi-way self-join — the
  * "re-execute on a relational dataflow engine" comparator) and on DuckDB
  * (the correctness oracle via [[repro.Oracle]]); both implement the
  * homomorphism semantics the paper's join-based materialization computes.
  */
object PatternSQL {

  private def lit(s: String): String = "'" + s.replace("'", "''") + "'"

  /** Returns the SQL text and the ordered output column names (the sorted
    * variable names, or the single column `m` for variable-free patterns).
    */
  def compile(q: QueryPattern, table: String = "edges"): (String, Vector[String]) = {
    val aliases = q.edges.indices.map(i => s"e$i")
    val from    = aliases.map(a => s"$table $a").mkString(", ")

    val occ: Vector[(String, String)] = // variable name -> column, first wins
      q.edges.zipWithIndex.flatMap { case (e, i) =>
        Seq(e.src match { case Vr(n) => Some(n -> s"e$i.src"); case _ => None },
            e.dst match { case Vr(n) => Some(n -> s"e$i.dst"); case _ => None }).flatten
      }
    val rep: Map[String, String] = occ.groupBy(_._1).view.mapValues(_.head._2).toMap

    val preds = q.edges.zipWithIndex.flatMap { case (e, i) =>
      val label = Some(s"e$i.label = ${lit(e.label)}")
      val src = e.src match {
        case Cst(l) => Some(s"e$i.src = ${lit(l)}")
        case Vr(n)  => if (rep(n) == s"e$i.src") None else Some(s"e$i.src = ${rep(n)}")
      }
      val dst = e.dst match {
        case Cst(l) => Some(s"e$i.dst = ${lit(l)}")
        case Vr(n)  => if (rep(n) == s"e$i.dst") None else Some(s"e$i.dst = ${rep(n)}")
      }
      Seq(label, src, dst).flatten
    }

    val cols = q.varNames
    val select =
      if (cols.isEmpty) "CAST(1 AS INT) AS m"
      else cols.map(n => s"${rep(n)} AS $n").mkString(", ")
    val sql = s"SELECT DISTINCT $select FROM $from WHERE ${preds.mkString(" AND ")}"
    (sql, if (cols.isEmpty) Vector("m") else cols)
  }

  /** Edges as a DataFrame with the oracle schema. */
  def edgesDf(spark: SparkSession, edges: Seq[Edge]): DataFrame = {
    val schema = StructType(Seq(
      StructField("src", StringType), StructField("label", StringType), StructField("dst", StringType)))
    spark.createDataFrame(
      spark.sparkContext.parallelize(edges.map(e => Row(e.src, e.label, e.dst)), 4), schema)
  }

  /** Evaluate a pattern on Spark over the given edge set (batch comparator). */
  def evalOnSpark(spark: SparkSession, edges: Seq[Edge], q: QueryPattern): DataFrame = {
    val (sql, _) = compile(q)
    edgesDf(spark, edges).createOrReplaceTempView("edges")
    spark.sql(sql)
  }

  /** An engine's accumulated bindings as a DataFrame matching the compiled
    * SQL's output schema, for oracle comparison. Variable-free queries map a
    * non-empty binding set to the single row (m=1).
    */
  def bindingsDf(spark: SparkSession, q: QueryPattern, bs: Set[Binding]): DataFrame = {
    val cols = if (q.varNames.isEmpty) Vector("m") else q.varNames
    val rows =
      if (q.varNames.isEmpty) (if (bs.nonEmpty) Seq(Row("1")) else Seq.empty)
      else bs.toSeq.map(b => Row(q.varNames.map(b): _*))
    val schema = StructType(cols.map(c => StructField(c, StringType)))
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 1), schema)
  }
}
