package repro.engine

import repro.graph.Edge
import repro.query.CoveringPaths.Path
import repro.query.QueryPattern.Binding
import repro.query.{Generic, GEdge, QueryPattern, Term, Vr}

import scala.collection.mutable

/** Shared relational machinery for evaluating covering paths against per-edge
  * materialized views and re-assembling per-query answers from per-path views
  * (paper §4.1 "Materialization" / §4.2 step 2 final joins).
  *
  * A path of k edges materializes into a relation of arity k+1 (one column
  * per path vertex position). Constant positions are enforced by the generic
  * edge views themselves (a `GEdge` retains literals); what the views do NOT
  * enforce is equality between repeated variables — that is the per-query
  * information TRIC keeps aside ("intersection of the paths") and applies
  * when producing final answers.
  */
object PathEval {

  /** The vertex terms at path positions 0..k. */
  def pathTerms(path: Path): Vector[Term] = path.head.src +: path.map(_.dst)

  /** For each position holding a repeated variable, the earliest position of
    * that same variable (identity for first occurrences and constants).
    */
  def eqClass(terms: Vector[Term]): Vector[Int] =
    terms.zipWithIndex.map {
      case (v: Vr, i) => terms.indexOf(v) min i
      case (_, i)     => i
    }

  /** Does a row satisfy the repeated-variable equalities of a path? */
  def consistent(row: Array[String], eq: Vector[Int]): Boolean = {
    var i = 0
    while (i < row.length) {
      if (eq(i) != i && row(eq(i)) != row(i)) return false
      i += 1
    }
    true
  }

  /** Fully recompute the matches of a covering path from the generic per-edge
    * views (Algorithm INV's per-update path materialization). Returns a
    * relation of arity path.size+1 with repeated-variable equality enforced.
    */
  def evalPathFull(path: Path, matOf: GEdge => Option[Rel], jc: JoinCache): Rel = {
    val terms = pathTerms(path)
    val eq    = eqClass(terms)
    val out   = new Rel(path.size + 1)
    val m0    = matOf(Generic.of(path.head)).getOrElse(return out)
    var cur: mutable.ArrayBuffer[Array[String]] =
      m0.rows.collect { case r if eq(1) == 1 || r(0) == r(1) => Array(r(0), r(1)) }
    var i = 1
    while (i < path.size && cur.nonEmpty) {
      val mi  = matOf(Generic.of(path(i))).getOrElse(return out)
      val idx = jc.index(mi, 0)
      val next = new mutable.ArrayBuffer[Array[String]]
      for (row <- cur; hit <- idx.probe(row(i))) {
        val t = hit(1)
        if (eq(i + 1) == i + 1 || row(eq(i + 1)) == t) next += (row :+ t)
      }
      cur = next
      i += 1
    }
    if (i == path.size) cur.foreach(out.add)
    out
  }

  /** Incrementally compute the NEW matches of a covering path contributed by
    * update `e` (Algorithm INC / TRIC delta joins): seed every path position
    * whose generic edge matches `e` with the single update tuple and extend
    * left and right through the (already updated) generic edge views.
    */
  def evalPathDelta(path: Path, matOf: GEdge => Option[Rel], jc: JoinCache, e: Edge): Rel = {
    val terms = pathTerms(path)
    val eq    = eqClass(terms)
    val out   = new Rel(path.size + 1)
    val gs    = path.map(Generic.of)

    for (p <- path.indices if gs(p).matches(e)) {
      // rows covering positions p..p+1, extended rightward then leftward
      var frontier = mutable.ArrayBuffer[Array[String]](Array(e.src, e.dst))
      var i = p + 1
      while (i < path.size && frontier.nonEmpty) {
        val mi  = matOf(gs(i)).getOrElse(new Rel(2))
        val idx = jc.index(mi, 0)
        val next = new mutable.ArrayBuffer[Array[String]]
        for (row <- frontier; hit <- idx.probe(row.last)) next += (row :+ hit(1))
        frontier = next
        i += 1
      }
      var j = p - 1
      while (j >= 0 && frontier.nonEmpty) {
        val mj  = matOf(gs(j)).getOrElse(new Rel(2))
        val idx = jc.index(mj, 1) // probe by destination: extending to the left
        val next = new mutable.ArrayBuffer[Array[String]]
        for (row <- frontier; hit <- idx.probe(row.head)) next += (hit(0) +: row)
        frontier = next
        j -= 1
      }
      frontier.foreach(r => if (consistent(r, eq)) out.add(r))
    }
    out
  }

  /** Join the per-path relations of one query on their shared variables and
    * project to full-query bindings (the paper's final join across covering
    * paths, using the recorded path intersections).
    *
    * `startIdx` selects which path relation seeds the join — callers pass the
    * DELTA relation so the paper's incremental final join starts from the
    * updated part. Remaining paths join in shared-variable-connectivity
    * order; each step hash-builds the smaller side, and bindings stay flat
    * arrays until the end.
    */
  def joinPaths(q: QueryPattern, paths: Vector[Path], rels: Vector[Rel],
                startIdx: Int = 0): Set[Binding] = {
    if (rels.exists(_.isEmpty)) return Set.empty
    val termVecs = paths.map(pathTerms)
    val order = orderByConnectivity(termVecs, startIdx)
    joinProjected(order.map(i => projectPath(rels(i), termVecs(i))))
  }

  /** A path relation projected to its distinct variables (flat rows, with the
    * repeated-variable equalities already enforced).
    */
  final case class Projected(vars: Vector[String], rows: mutable.ArrayBuffer[Array[String]])

  def projectPath(rel: Rel, terms: Vector[Term]): Projected = {
    val p = new IncrementalProjection(rel, terms)
    p.refresh()
  }

  /** Projection with an append cursor, so a caching engine (TRIC+) can keep
    * the projected view across updates and only process newly added rows —
    * the paper's "cache … intermediate results whenever possible".
    */
  final class IncrementalProjection(val rel: Rel, terms: Vector[Term]) {
    private val eq   = eqClass(terms)
    private val vars = terms.collect { case Vr(n) => n }.distinct
    private val pos  = vars.map(n => terms.indexWhere { case Vr(`n`) => true; case _ => false })
    val proj = Projected(vars, new mutable.ArrayBuffer[Array[String]])
    private var cursor = 0

    def refresh(): Projected = {
      while (cursor < rel.size) {
        val r = rel.rows(cursor)
        if (consistent(r, eq)) proj.rows += pos.map(r).toArray
        cursor += 1
      }
      proj
    }
  }

  /** A hash index over a projection's rows on a fixed key-column set, with an
    * append cursor — the build-phase structure of the final joins, cacheable
    * across updates by the "+" engines (paper §4.2 Caching).
    */
  final class ProjIndex(val source: IncrementalProjection, val keyIdxs: Vector[Int]) {
    private val idx = mutable.HashMap.empty[String, mutable.ArrayBuffer[Array[String]]]
    private var cursor = 0

    def refresh(): this.type = {
      source.refresh()
      val rows = source.proj.rows
      while (cursor < rows.size) {
        val r = rows(cursor)
        idx.getOrElseUpdate(ProjIndex.key(r, keyIdxs), new mutable.ArrayBuffer[Array[String]]) += r
        cursor += 1
      }
      this
    }

    def probe(k: String): collection.Seq[Array[String]] = idx.getOrElse(k, Rel.noRows)
  }

  object ProjIndex {
    def key(r: Array[String], ks: Vector[Int]): String = {
      if (ks.isEmpty) return ""
      val sb = new java.lang.StringBuilder
      var i = 0
      while (i < ks.size) { if (i > 0) sb.append(' '); sb.append(r(ks(i))); i += 1 }
      sb.toString
    }
  }

  /** Seed-first ordering of path relations by shared-variable connectivity
    * (avoids accidental cross products mid-join).
    */
  def orderByConnectivity(termVecs: Vector[Vector[Term]], startIdx: Int): Vector[Int] = {
    val order = mutable.ArrayBuffer(startIdx)
    val left  = mutable.ArrayBuffer.from(termVecs.indices.filter(_ != startIdx))
    while (left.nonEmpty) {
      val bound = order.flatMap(i => termVecs(i).collect { case Vr(n) => n }).toSet
      val next  = left.find(i => termVecs(i).exists { case Vr(n) => bound(n); case _ => false })
        .getOrElse(left.head)
      order += next
      left  -= next
    }
    order.toVector
  }

  /** Multi-way hash join of projected path relations in the given order;
    * each step builds on the smaller side. Rows stay flat arrays; bindings
    * materialize only at the end.
    */
  def joinProjected(ps: Seq[Projected]): Set[Binding] = {
    if (ps.exists(_.rows.isEmpty)) return Set.empty
    var acc = ps.head
    for (p <- ps.tail if acc.rows.nonEmpty) {
      val shared = p.vars.filter(acc.vars.contains)
      val accKey = shared.map(acc.vars.indexOf)
      val pKey   = shared.map(p.vars.indexOf)
      val newIdx = p.vars.zipWithIndex.filterNot { case (n, _) => acc.vars.contains(n) }
      def key(r: Array[String], ks: Vector[Int]): String = ks.map(r).mkString(" ")
      val out = new mutable.ArrayBuffer[Array[String]]
      if (acc.rows.size <= p.rows.size) {
        val h = acc.rows.groupBy(key(_, accKey))
        p.rows.foreach { pr =>
          h.getOrElse(key(pr, pKey), Nil).foreach(ar => out += (ar ++ newIdx.map { case (_, j) => pr(j) }))
        }
      } else {
        val h = p.rows.groupBy(key(_, pKey))
        acc.rows.foreach { ar =>
          h.getOrElse(key(ar, accKey), Nil).foreach(pr => out += (ar ++ newIdx.map { case (_, j) => pr(j) }))
        }
      }
      acc = Projected(acc.vars ++ newIdx.map(_._1), out)
    }
    acc.rows.iterator.map(r => acc.vars.zip(r).toMap).toSet
  }
}
