package repro.partition

import scala.collection.mutable
import repro.graph.DiGraph

/** Louvain community detection (Blondel et al. 2008), first-level local-move
  * phase with bounded passes over the undirected view.
  *
  * Each pass moves every vertex to the neighboring community with the best
  * positive modularity gain; passes repeat until no vertex moves (or
  * `maxPasses`). One level suffices for GoGraph's divide step — the combine
  * phase treats whole communities as super-vertices anyway.
  */
class Louvain(maxPasses: Int = 10) extends Partitioner {
  val name = "Louvain"

  def partition(g: DiGraph, k: Int): Array[Int] = {
    val n = g.numVertices
    if (n == 0) return Array.empty
    if (g.numEdges == 0) return Array.tabulate(n)(identity)
    val m2 = 2.0 * g.numEdges

    val comm    = Array.tabulate(n)(identity)
    val deg     = Array.tabulate(n)(v => g.degree(v).toDouble)
    val commDeg = deg.clone()

    val wTo = mutable.HashMap.empty[Int, Double]
    var pass   = 0
    var moved  = true
    while (moved && pass < maxPasses) {
      moved = false
      var v = 0
      while (v < n) {
        wTo.clear()
        val addNbr = (u: Int) => if (u != v)
          wTo.update(comm(u), wTo.getOrElse(comm(u), 0.0) + 1.0)
        g.outNeighbors(v).foreach(addNbr)
        g.inNeighbors(v).foreach(addNbr)
        if (wTo.nonEmpty) {
          val cur = comm(v)
          commDeg(cur) -= deg(v) // evaluate gains with v removed from its community
          var bestC = cur
          var bestGain = wTo.getOrElse(cur, 0.0) / m2 - deg(v) * commDeg(cur) / (m2 * m2)
          wTo.foreach { case (c, w) =>
            if (c != cur) {
              val gain = w / m2 - deg(v) * commDeg(c) / (m2 * m2)
              if (gain > bestGain + 1e-15 || (math.abs(gain - bestGain) <= 1e-15 && c < bestC)) {
                bestGain = gain; bestC = c
              }
            }
          }
          commDeg(bestC) += deg(v)
          if (bestC != cur) { comm(v) = bestC; moved = true }
        }
        v += 1
      }
      pass += 1
    }
    Partitioner.compact(comm)
  }
}

object Louvain extends Louvain(maxPasses = 10)
