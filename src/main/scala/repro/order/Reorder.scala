package repro.order

import repro.graph.DiGraph

/** A graph reordering method R(G): returns a vertex processing order. */
trait Reorder extends Serializable {
  /** Display name matching the paper's Table II row labels. */
  def name: String

  /** Compute the processing order for `g`. Must return a valid permutation. */
  def order(g: DiGraph): VertexOrder
}
