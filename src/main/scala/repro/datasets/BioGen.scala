package repro.datasets

import repro.graph.Edge

import scala.collection.mutable
import scala.util.Random

/** Synthetic BioGRID-like protein-interaction stream (DESIGN.md dataset
  * substitution). Exactly the paper's stress property: a single edge label
  * (`interacts`) over a single vertex type (proteins), so EVERY update
  * affects the entire query database. Preferential attachment produces hub
  * proteins; reciprocal interactions and planted rings make cycle queries
  * samplable.
  *
  * Deterministic in (nEdges, seed); emitted edges are unique.
  */
object BioGen {

  def stream(nEdges: Int, seed: Long = 13): Vector[Edge] = {
    val rng  = new Random(seed)
    val out  = new mutable.ArrayBuffer[Edge](nEdges)
    val seen = mutable.HashSet.empty[Edge]
    val prot = new mutable.ArrayBuffer[String]
    var nP   = 0

    def emit(e: Edge): Unit = if (out.size < nEdges && seen.add(e)) out += e
    def newProt(): String = { nP += 1; val p = s"pr$nP"; prot += p; p }
    // preferential: earlier (hub) proteins are picked more often (softened
    // exponent — strong hubs make walk counts explode for every algorithm)
    def pick(): String = {
      val u = rng.nextDouble()
      prot((math.pow(u, 1.5) * prot.size).toInt min (prot.size - 1))
    }

    (1 to 4).foreach(_ => newProt())
    emit(Edge(prot(0), "interacts", prot(1)))

    while (out.size < nEdges) {
      rng.nextInt(100) match {
        case w if w < 30 => // new protein attaches to an existing hub
          val p = newProt()
          val q = pick()
          if (q != p) emit(Edge(p, "interacts", q))
        case w if w < 95 => // interaction between existing proteins
          val a = pick(); val b = pick()
          if (a != b) {
            emit(Edge(a, "interacts", b))
            if (rng.nextDouble() < 0.2) emit(Edge(b, "interacts", a))
          }
        case _ => // planted interaction ring (protein complexes)
          val k = 3 + rng.nextInt(5)
          val ring = Vector.fill(k)(pick()).distinct
          if (ring.size >= 3)
            ring.indices.foreach(i => emit(Edge(ring(i), "interacts", ring((i + 1) % ring.size))))
      }
    }
    out.toVector
  }
}
