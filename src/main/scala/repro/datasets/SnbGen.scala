package repro.datasets

import repro.graph.Edge

import scala.collection.mutable
import scala.util.Random

/** Synthetic LDBC-SNB-like social-network graph stream (DESIGN.md dataset
  * substitution). Simulates user activity events — account creation,
  * friendship linking, forum membership, content creation and interaction —
  * each emitting one or more edges, like the SNB update stream the paper
  * replays. `knows` cycles are planted occasionally so that cycle-class
  * queries are samplable, mirroring SNB's dense friendship subgraphs.
  *
  * Deterministic in (nEdges, seed); emitted edges are unique.
  */
object SnbGen {

  def stream(nEdges: Int, seed: Long = 7): Vector[Edge] = {
    val rng  = new Random(seed)
    val out  = new mutable.ArrayBuffer[Edge](nEdges)
    val seen = mutable.HashSet.empty[Edge]

    val persons  = new mutable.ArrayBuffer[String]
    val forums   = new mutable.ArrayBuffer[String]
    val posts    = new mutable.ArrayBuffer[String]
    val comments = new mutable.ArrayBuffer[String]
    val cities   = Vector.tabulate(20)(i => s"ci$i")
    val tags     = Vector.tabulate(60)(i => s"t$i")
    var np, nf, npo, nc = 0

    def emit(e: Edge): Unit = if (out.size < nEdges && seen.add(e)) out += e

    // recency-biased pick: newer entities are more active (social networks);
    // softened exponent — extreme hubs make walk counts explode for every
    // algorithm and are not representative of SNB's degree distribution
    def pick(xs: mutable.ArrayBuffer[String]): String = {
      val u = rng.nextDouble()
      xs((math.pow(u, 1.5) * xs.size).toInt min (xs.size - 1))
    }
    def newPerson(): String = { np += 1; val p = s"p$np"; persons += p; p }

    // bootstrap a small population
    (1 to 5).foreach { _ =>
      val p = newPerson(); emit(Edge(p, "locatedIn", cities(rng.nextInt(cities.size))))
    }

    while (out.size < nEdges) {
      rng.nextInt(100) match {
        case w if w < 8 => // account creation
          val p = newPerson()
          emit(Edge(p, "locatedIn", cities(rng.nextInt(cities.size))))
          val q = pick(persons)
          if (q != p) {
            emit(Edge(p, "knows", q))
            if (rng.nextDouble() < 0.4) emit(Edge(q, "knows", p))
          }
        case w if w < 23 => // friendship linking
          val a = pick(persons); val b = pick(persons)
          if (a != b) {
            emit(Edge(a, "knows", b))
            if (rng.nextDouble() < 0.3) emit(Edge(b, "knows", a))
          }
        case w if w < 26 => // forum creation + moderator
          nf += 1; val f = s"f$nf"; forums += f
          emit(Edge(f, "hasModerator", pick(persons)))
        case w if w < 34 && forums.nonEmpty => // forum membership
          emit(Edge(pick(forums), "hasMember", pick(persons)))
        case w if w < 54 && forums.nonEmpty => // post creation
          npo += 1; val po = s"po$npo"; posts += po
          emit(Edge(pick(persons), "posted", po))
          emit(Edge(po, "containedIn", pick(forums)))
          if (rng.nextDouble() < 0.5) emit(Edge(po, "hasTag", tags(rng.nextInt(tags.size))))
        case w if w < 72 && posts.nonEmpty => // comment
          nc += 1; val c = s"c$nc"; comments += c
          emit(Edge(c, "hasCreator", pick(persons)))
          emit(Edge(c, "replyOf", pick(posts)))
        case w if w < 97 && posts.nonEmpty => // like
          emit(Edge(pick(persons), "likes", pick(posts)))
        case _ => // plant a knows-cycle so cycle queries are samplable
          val k = 3 + rng.nextInt(5)
          val ring = Vector.fill(k)(pick(persons)).distinct
          if (ring.size >= 3)
            ring.indices.foreach(i => emit(Edge(ring(i), "knows", ring((i + 1) % ring.size))))
      }
    }
    out.toVector
  }
}
