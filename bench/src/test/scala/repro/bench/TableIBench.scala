package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.Eval
import repro.graph.GraphGen

/** Table I: dataset statistics — paper's downloads vs our synthetic
  * analogues (DESIGN.md §4). Prints the side-by-side table recorded in
  * EXPERIMENTS.md.
  */
class TableIBench extends AnyFunSuite {

  test("Table I: dataset analogues materialize with the documented sizes") {
    val rows = Eval.tableI()
    println(Eval.renderTableI(rows))

    assert(rows.map(_.abbr) == GraphGen.datasetNames)
    // IC matches the paper exactly; the rest are laptop-scaled
    val ic = rows.find(_.abbr == "IC").get
    assert(ic.ourV == ic.paperV && ic.ourE == ic.paperE)
    rows.foreach { r =>
      assert(r.ourV >= 10000L, s"${r.abbr}: analogue too small (${r.ourV} vertices)")
      assert(r.ourE >= 49000L, s"${r.abbr}: analogue too small (${r.ourE} edges)")
      assert(r.ourV <= r.paperV, s"${r.abbr}: analogue must not exceed paper scale")
    }
  }

  test("Table I: analogues preserve structure class (degree skew)") {
    GraphGen.datasetNames.foreach { name =>
      val g = GraphGen.dataset(name)
      val maxDeg = (0 until g.numVertices).map(g.degree).max
      val avgDeg = 2.0 * g.numEdges / g.numVertices
      assert(maxDeg > 8 * avgDeg,
        s"$name: power-law analogue should have hubs (max=$maxDeg avg=$avgDeg)")
    }
  }
}
