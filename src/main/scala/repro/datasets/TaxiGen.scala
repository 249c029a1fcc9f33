package repro.datasets

import repro.graph.Edge

import scala.collection.mutable
import scala.util.Random

/** Synthetic NYC-TAXI-like graph stream (DESIGN.md dataset substitution for
  * the DEBS'15 ride data). Each taxi ride becomes a small cluster of edges
  * around a ride vertex — medallion, driver, pickup/dropoff zone, hour and
  * fare bucket — plus connective edges (consecutive rides of the same
  * medallion, zone→borough, hour→shift) so that chain-shaped patterns exist.
  * The character the paper exploits is preserved: very few edge labels over a
  * heavily reused small vertex population, so materialized views grow large.
  *
  * Deterministic in (nEdges, seed); emitted edges are unique.
  */
object TaxiGen {

  def stream(nEdges: Int, seed: Long = 11): Vector[Edge] = {
    val rng  = new Random(seed)
    val out  = new mutable.ArrayBuffer[Edge](nEdges)
    val seen = mutable.HashSet.empty[Edge]

    val zones     = Vector.tabulate(60)(i => s"z$i")
    val boroughs  = Vector.tabulate(6)(i => s"b$i")
    val hours     = Vector.tabulate(24)(i => s"h$i")
    val shifts    = Vector.tabulate(3)(i => s"s$i")
    val nMed      = (nEdges / 60) max 8
    val medallion = Vector.tabulate(nMed)(i => s"m$i")
    val drivers   = Vector.tabulate((nMed * 3) / 2 max 8)(i => s"d$i")
    val lastRide  = mutable.HashMap.empty[String, String] // medallion -> last ride

    def emit(e: Edge): Unit = if (out.size < nEdges && seen.add(e)) out += e

    // static dimension edges first (zone geography, hour shifts)
    zones.foreach(z => emit(Edge(z, "locatedIn", boroughs(z.drop(1).toInt % boroughs.size))))
    hours.foreach(h => emit(Edge(h, "inShift", shifts(h.drop(1).toInt / 8))))

    var nr = 0
    while (out.size < nEdges) {
      nr += 1
      val r = s"r$nr"
      val m = medallion(rng.nextInt(medallion.size))
      emit(Edge(r, "byMedallion", m))
      emit(Edge(r, "byDriver", drivers(rng.nextInt(drivers.size))))
      emit(Edge(r, "pickup", zones(rng.nextInt(zones.size))))
      emit(Edge(r, "dropoff", zones(rng.nextInt(zones.size))))
      emit(Edge(r, "atHour", hours(rng.nextInt(hours.size))))
      emit(Edge(r, "fare", s"fb${rng.nextInt(10)}"))
      lastRide.get(m).foreach(prev => emit(Edge(r, "follows", prev)))
      lastRide(m) = r
    }
    out.toVector
  }
}
