package repro.partition

import repro.graph.DiGraph

/** Fennel streaming partitioning (Tsourakakis et al., WSDM'14).
  *
  * Vertices stream in ID order; each is assigned to the partition maximizing
  * |N(v) ∩ P_i| − α·(( |P_i|+1 )^γ − |P_i|^γ) with γ = 1.5,
  * α = √k · m / n^1.5, subject to the balance cap ν·n/k (ν = 1.1).
  * The paper observes Fennel underperforms as a GoGraph divide step because
  * streaming decisions see only a prefix of the graph — this reproduction
  * keeps that property.
  */
class Fennel(gamma: Double = 1.5, nu: Double = 1.1) extends Partitioner {
  val name = "Fennel"

  def partition(g: DiGraph, k: Int): Array[Int] = {
    val n = g.numVertices
    if (n == 0) return Array.empty
    val kk = math.max(1, math.min(k, n))
    if (kk == 1) return new Array[Int](n)
    val m     = math.max(1, g.numEdges)
    val alpha = math.sqrt(kk.toDouble) * m / math.pow(n.toDouble, gamma)
    val cap   = math.max(1.0, nu * n.toDouble / kk)

    val labels = Array.fill(n)(-1)
    val sizes  = new Array[Int](kk)
    val nbrCnt = new Array[Int](kk)
    var v = 0
    while (v < n) {
      java.util.Arrays.fill(nbrCnt, 0)
      val addNbr = (u: Int) => if (labels(u) >= 0) nbrCnt(labels(u)) += 1
      g.outNeighbors(v).foreach(addNbr)
      g.inNeighbors(v).foreach(addNbr)
      var best = -1; var bestScore = Double.NegativeInfinity
      var p = 0
      while (p < kk) {
        if (sizes(p) + 1 <= cap) {
          val s = sizes(p).toDouble
          val score = nbrCnt(p) - alpha * (math.pow(s + 1, gamma) - math.pow(s, gamma))
          if (score > bestScore) { bestScore = score; best = p }
        }
        p += 1
      }
      if (best == -1) best = sizes.zipWithIndex.minBy(_._1)._2 // all capped: least loaded
      labels(v) = best
      sizes(best) += 1
      v += 1
    }
    Partitioner.compact(labels)
  }
}

object Fennel extends Fennel(1.5, 1.1)
