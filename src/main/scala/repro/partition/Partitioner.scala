package repro.partition

import repro.graph.DiGraph

/** Graph partitioning / community detection used by GoGraph's divide phase
  * (paper §IV-A "Divide other vertices", Fig 13).
  *
  * `partition(g, k)` returns a dense community id (0 until K) per vertex.
  * Community methods (Rabbit, Louvain) treat `k` as advisory and return
  * their natural community count; balanced methods (MetisLike, Fennel)
  * honor it.
  */
trait Partitioner extends Serializable {
  def name: String
  def partition(g: DiGraph, k: Int): Array[Int]
}

object Partitioner {
  /** Compact arbitrary labels to dense ids 0 until K, preserving first-seen order. */
  def compact(labels: Array[Int]): Array[Int] = {
    val map = scala.collection.mutable.HashMap.empty[Int, Int]
    labels.map(l => map.getOrElseUpdate(l, map.size))
  }

  /** Number of distinct partitions in a dense labeling. */
  def numParts(labels: Array[Int]): Int = if (labels.isEmpty) 0 else labels.max + 1

  /** Edges whose endpoints share a partition (locality quality measure). */
  def internalEdges(g: DiGraph, labels: Array[Int]): Long = {
    var c = 0L
    g.foreachEdge((u, v, _) => if (labels(u) == labels(v)) c += 1)
    c
  }
}
