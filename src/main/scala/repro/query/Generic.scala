package repro.query

import repro.graph.Edge

/** A genericized pattern edge (paper §4.1, "Variable Handling"): every
  * variable vertex is collapsed to the generic `?var` so that structurally
  * identical path constraints from different queries land on the same trie
  * nodes / inverted-index keys. `None` encodes `?var`, `Some(l)` a literal.
  */
final case class GEdge(src: Option[String], label: String, dst: Option[String]) {

  /** Does a concrete stream edge match this generic edge? */
  def matches(e: Edge): Boolean =
    e.label == label && src.forall(_ == e.src) && dst.forall(_ == e.dst)

  def show: String = {
    def t(o: Option[String]) = o.fold("?var")(l => s""""$l"""")
    s"${t(src)} -[$label]-> ${t(dst)}"
  }
}

object Generic {

  /** Genericize one pattern edge (drop variable names, keep literals). */
  def of(e: PatternEdge): GEdge =
    GEdge(
      e.src match { case Cst(l) => Some(l); case _ => None },
      e.label,
      e.dst match { case Cst(l) => Some(l); case _ => None },
    )

  /** Genericize a covering path into the ordered trie key sequence. */
  def ofPath(p: CoveringPaths.Path): Vector[GEdge] = p.map(of)

  /** The four generalizations of a concrete stream edge — the keys under
    * which any indexed generic edge matching it can live. Query answering
    * probes `edgeInd`/materialized views with exactly these (paper Fig. 9
    * line 1: `edgeInd[e_i]`).
    */
  def generalizations(e: Edge): Seq[GEdge] =
    Seq(
      GEdge(Some(e.src), e.label, Some(e.dst)),
      GEdge(Some(e.src), e.label, None),
      GEdge(None, e.label, Some(e.dst)),
      GEdge(None, e.label, None),
    )
}
