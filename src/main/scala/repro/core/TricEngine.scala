package repro.core

import repro.engine.{ContinuousEngine, JoinCache, PathEval, Rel}
import repro.graph.Edge
import repro.query.CoveringPaths.Path
import repro.query.{CoveringPaths, GEdge, Generic, QueryPattern}

import scala.collection.mutable

/** TRIC — TRIe-based Clustering (paper §4), the paper's primary contribution.
  *
  * Indexing (§4.1): each query is decomposed into covering paths; each path is
  * genericized (variables → `?var`) and threaded into a forest of tries whose
  * nodes are generic edges, so queries sharing path prefixes share trie nodes
  * — and therefore share the per-node materialized views built at answering
  * time. `rootInd` finds the trie for a path's first edge, `edgeInd` maps a
  * generic edge to the tries (nodes) indexing it, and `queryInd` remembers for
  * every query the last trie node of each of its covering paths.
  *
  * Answering (§4.2): for an update, the affected trie nodes are located via
  * `edgeInd`; the node's view is extended by joining its parent's view with
  * just the update tuple (incremental, not a full re-join), and the delta is
  * propagated down the sub-trie — a sub-trie whose delta join comes up empty
  * is pruned. Queries registered at reached path-end nodes are then answered
  * by joining their covering-path views (applying the variable-equality
  * constraints the genericization dropped).
  *
  * @param caching true = TRIC+ — reuse and incrementally refresh the hash-join
  *                build structures instead of rebuilding them per join.
  */
final class TricEngine(caching: Boolean) extends ContinuousEngine {

  def name: String = if (caching) "TRIC+" else "TRIC"

  /** One trie node: a generic edge at a given depth. Its materialized view
    * has one column per path position 0..depth+1. Query ids are registered at
    * the node ending one of their covering paths.
    */
  final class Node(val key: GEdge, val depth: Int, val parent: Node) {
    val children = new mutable.ArrayBuffer[Node]
    val matV     = new Rel(depth + 2)
    val queries  = new mutable.ArrayBuffer[Int]
  }

  /** rootInd: first generic edge of a path → trie root. */
  val rootInd = mutable.HashMap.empty[GEdge, Node]

  /** edgeInd: generic edge → every trie node keyed by it. The paper stores
    * trie roots and DFS-walks to the node; we keep direct node references —
    * the same lookups with the constant-factor walk removed.
    */
  val edgeInd = mutable.HashMap.empty[GEdge, mutable.ArrayBuffer[Node]]

  /** Per-edge materialized views shared by the whole query set: all stream
    * edges matching each generic edge seen in any indexed path.
    */
  val edgeMat = mutable.HashMap.empty[GEdge, Rel]

  /** queryInd: query id → (original pattern, covering paths, last trie node
    * of each path) — everything needed for the final per-query join.
    */
  val queryInd = mutable.LinkedHashMap.empty[Int, (QueryPattern, Vector[Path], Vector[Node])]

  private[repro] val jc = new JoinCache(caching)

  def indexQuery(q: QueryPattern): Unit = {
    val paths = CoveringPaths.cover(q)
    val lasts = paths.map { p =>
      val gs = Generic.ofPath(p)
      var node: Node = rootInd.getOrElseUpdate(gs.head, mkNode(gs.head, 0, null))
      for (g <- gs.tail) {
        node = node.children.find(_.key == g).getOrElse {
          val n = mkNode(g, node.depth + 1, node)
          node.children += n
          n
        }
      }
      node.queries += q.id
      node
    }
    queryInd(q.id) = (q, paths, lasts)
  }

  private def mkNode(g: GEdge, depth: Int, parent: Node): Node = {
    val n = new Node(g, depth, parent)
    edgeInd.getOrElseUpdate(g, new mutable.ArrayBuffer[Node]) += n
    edgeMat.getOrElseUpdate(g, new Rel(2))
    n
  }

  def onUpdate(e: Edge): collection.Set[Int] = {
    val gens = Generic.generalizations(e).filter(edgeMat.contains)
    // 1. extend the shared per-edge views with the update
    var fresh = false
    for (g <- gens) fresh |= edgeMat(g).add(Array(e.src, e.dst))
    val matchedNow = mutable.LinkedHashSet.empty[Int]
    if (gens.isEmpty || !fresh) return matchedNow // duplicate edge: no-op

    // 2. locate affected nodes (shallowest first so parents see their deltas
    //    before deeper occurrences of the same edge are processed). While
    //    propagating, collect the delta that reaches each path-end node: the
    //    paper's final joins use "only the updated part of a materialized
    //    view" (Fig. 11), never the full view.
    val affectedNodes = gens.flatMap(edgeInd(_)).sortBy(_.depth)
    val endDeltas = mutable.LinkedHashMap.empty[Node, Rel]

    for (n <- affectedNodes) {
      val delta = new Rel(n.depth + 2)
      if (n.parent == null) {
        if (n.matV.add(Array(e.src, e.dst))) delta.add(Array(e.src, e.dst))
      } else {
        // join the parent's view with just the update tuple: parent rows
        // whose tail vertex is the update's source. TRIC+ probes a cached
        // incremental index; TRIC re-scans (rebuilds) per the paper.
        if (caching) {
          val pIdx = jc.index(n.parent.matV, n.depth)
          for (row <- pIdx.probe(e.src)) {
            val r = row :+ e.dst
            if (n.matV.add(r)) delta.add(r)
          }
        } else {
          for (row <- n.parent.matV.rows if row(n.depth) == e.src) {
            val r = row :+ e.dst
            if (n.matV.add(r)) delta.add(r)
          }
        }
      }
      if (delta.nonEmpty) propagate(n, delta, endDeltas)
    }

    // 3. final joins: for every query registered at a path-end node that
    //    received a delta, join that DELTA against the other paths' full
    //    views — new answers only, like the paper's incremental-view joins.
    val touched = mutable.LinkedHashMap.empty[Int, mutable.LinkedHashSet[Int]] // qid -> path indices
    for ((node, _) <- endDeltas; qid <- node.queries) {
      val (_, _, lasts) = queryInd(qid)
      val idxs = touched.getOrElseUpdate(qid, mutable.LinkedHashSet.empty)
      lasts.indices.foreach(i => if (lasts(i) eq node) idxs += i)
    }
    for ((qid, pathIdxs) <- touched) {
      val (q, paths, lasts) = queryInd(qid)
      if (lasts.forall(_.matV.nonEmpty)) {
        val termVecs = paths.map(PathEval.pathTerms)
        val bs = pathIdxs.iterator.flatMap { t =>
          finalJoin(qid, t, paths, lasts, termVecs, endDeltas(lasts(t)))
        }.toSet
        if (bs.nonEmpty) { record(qid, bs); matchedNow += qid }
      }
    }
    matchedNow
  }

  /** The final join for one query, seeded by the delta that reached the end
    * of covering path `t` (paper Fig. 9 lines 8–13, incremental per Fig. 11):
    * probe each other path's projected view on the shared variables. TRIC+
    * reuses the build-phase hash structures across updates (cached,
    * incrementally refreshed); TRIC rebuilds them per join and discards them,
    * exactly the §4.2 "Caching" contrast.
    */
  private def finalJoin(qid: Int, t: Int, paths: Vector[Path], lasts: Vector[Node],
                        termVecs: Vector[Vector[repro.query.Term]],
                        delta: Rel): Set[repro.query.QueryPattern.Binding] = {
    val deltaProj = PathEval.projectPath(delta, termVecs(t))
    if (deltaProj.rows.isEmpty) return Set.empty
    val order = PathEval.orderByConnectivity(termVecs, t)

    var accVars = deltaProj.vars
    var accRows: mutable.ArrayBuffer[Array[String]] = deltaProj.rows
    for (i <- order.tail if accRows.nonEmpty) {
      val proj =
        if (caching)
          projCache.getOrElseUpdate((qid, i), new PathEval.IncrementalProjection(lasts(i).matV, termVecs(i)))
        else new PathEval.IncrementalProjection(lasts(i).matV, termVecs(i))
      proj.refresh()
      val pVars   = proj.proj.vars
      val shared  = pVars.filter(accVars.contains)
      val pKey    = shared.map(pVars.indexOf)
      val accKey  = shared.map(accVars.indexOf)
      val newCols = pVars.zipWithIndex.filterNot { case (n, _) => accVars.contains(n) }
      val idx =
        if (caching)
          projIdxCache.getOrElseUpdate((qid, i, pKey.mkString(",")), new PathEval.ProjIndex(proj, pKey))
        else new PathEval.ProjIndex(proj, pKey)
      idx.refresh()
      val out = new mutable.ArrayBuffer[Array[String]]
      accRows.foreach { ar =>
        idx.probe(PathEval.ProjIndex.key(ar, accKey)).foreach { pr =>
          out += (ar ++ newCols.map { case (_, j) => pr(j) })
        }
      }
      accVars ++= newCols.map(_._1)
      accRows = out
    }
    accRows.iterator.map(r => accVars.zip(r).toMap).toSet
  }

  /** TRIC+'s cached intermediate structures: projected path views and their
    * build-phase hash indexes, both refreshed incrementally.
    */
  private val projCache   = mutable.HashMap.empty[(Int, Int), PathEval.IncrementalProjection]
  private val projIdxCache = mutable.HashMap.empty[(Int, Int, String), PathEval.ProjIndex]

  /** Push a delta down the sub-trie, pruning branches whose join is empty.
    * TRIC+ probes a cached incremental index on the edge view; TRIC performs
    * a from-scratch hash join (build the small delta, scan the edge view).
    * Deltas reaching path-end nodes (nodes with registered queries) are
    * accumulated into `endDeltas` for the final joins.
    */
  private def propagate(n: Node, delta: Rel, endDeltas: mutable.LinkedHashMap[Node, Rel]): Unit = {
    if (n.queries.nonEmpty) {
      val acc = endDeltas.getOrElseUpdate(n, new Rel(n.depth + 2))
      delta.rows.foreach(acc.add)
    }
    for (c <- n.children) {
      val childDelta = new Rel(c.depth + 2)
      if (caching) {
        val eIdx = jc.index(edgeMat(c.key), 0)
        for (row <- delta.rows; hit <- eIdx.probe(row(n.depth + 1))) {
          val r = row :+ hit(1)
          if (c.matV.add(r)) childDelta.add(r)
        }
      } else {
        val build = delta.rows.groupBy(_(n.depth + 1))
        jc.builds += 1
        for (er <- edgeMat(c.key).rows; row <- build.getOrElse(er(0), Nil)) {
          val r = row :+ er(1)
          if (c.matV.add(r)) childDelta.add(r)
        }
      }
      if (childDelta.nonEmpty) propagate(c, childDelta, endDeltas)
    }
  }

  /** Structures whose size constitutes the engine's memory footprint. */
  def memoryRoots: Seq[AnyRef] =
    Seq(rootInd, edgeInd, edgeMat, queryInd) ++
      (if (caching) Seq(jc, projCache, projIdxCache) else Seq.empty)
}
