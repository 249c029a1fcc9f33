package repro.query

import repro.graph.Edge

/** A vertex term in a query graph pattern (paper Definition 4): either a
  * literal vertex label or a named variable.
  */
sealed trait Term {
  def isVar: Boolean
  /** Pretty form used in covering-path dumps and error messages. */
  def show: String
}

/** A literal vertex — matches exactly the graph vertex with this label. */
final case class Cst(label: String) extends Term {
  def isVar: Boolean = false
  def show: String   = s""""$label""""
}

/** A variable vertex — matches any graph vertex; repeated occurrences of the
  * same variable inside a query must bind the same vertex.
  */
final case class Vr(name: String) extends Term {
  def isVar: Boolean = true
  def show: String   = s"?$name"
}

/** One edge of a query graph pattern: `src -[label]-> dst` with `src`/`dst`
  * terms. Edge labels are always literals in the paper's model.
  */
final case class PatternEdge(src: Term, label: String, dst: Term) {
  def show: String = s"${src.show} -[$label]-> ${dst.show}"

  /** Does a concrete graph edge satisfy this pattern edge's constant
    * constraints (ignoring variable-consistency across edges)?
    */
  def matchesLocally(e: Edge): Boolean =
    e.label == label &&
      (src match { case Cst(l) => l == e.src; case _ => true }) &&
      (dst match { case Cst(l) => l == e.dst; case _ => true })
}

/** A query graph pattern (paper Definition 4): a directed labeled multigraph
  * over terms. Satisfaction over the streamed graph is homomorphism-based —
  * the paper answers queries by relational joins of per-edge materialized
  * views, and joins do not enforce that distinct variables bind distinct
  * vertices. The DuckDB oracle mirrors this via plain self-joins.
  */
final case class QueryPattern(id: Int, edges: Vector[PatternEdge]) {
  require(edges.nonEmpty, s"query $id has no edges")

  /** All terms (vertices) of the pattern, in first-appearance order. */
  lazy val terms: Vector[Term] =
    edges.flatMap(e => Vector(e.src, e.dst)).distinct

  /** Variable names, sorted — the output schema of the query's bindings. */
  lazy val varNames: Vector[String] =
    terms.collect { case Vr(n) => n }.distinct.sorted

  def show: String = edges.map(_.show).mkString(s"Q$id{", " , ", "}")
}

object QueryPattern {

  /** A binding of the query's variables to graph vertices — one answer row. */
  type Binding = Map[String, String]
}
