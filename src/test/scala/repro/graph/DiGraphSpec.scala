package repro.graph

import repro.SparkSpec

class DiGraphSpec extends SparkSpec {

  private def diamond: DiGraph =
    DiGraph.unweighted(4, Seq((0, 1), (0, 2), (1, 3), (2, 3)))

  test("empty graph has zero vertices and edges") {
    val g = DiGraph.unweighted(0, Seq.empty)
    assert(g.numVertices == 0)
    assert(g.numEdges == 0)
  }

  test("vertex count and edge count") {
    val g = diamond
    assert(g.numVertices == 4)
    assert(g.numEdges == 4)
  }

  test("out-degrees of diamond") {
    val g = diamond
    assert(g.outDegree(0) == 2)
    assert(g.outDegree(1) == 1)
    assert(g.outDegree(2) == 1)
    assert(g.outDegree(3) == 0)
  }

  test("in-degrees of diamond") {
    val g = diamond
    assert(g.inDegree(0) == 0)
    assert(g.inDegree(1) == 1)
    assert(g.inDegree(2) == 1)
    assert(g.inDegree(3) == 2)
  }

  test("total degree is in + out") {
    val g = diamond
    (0 until 4).foreach(v => assert(g.degree(v) == g.inDegree(v) + g.outDegree(v)))
  }

  test("out-neighbors are correct") {
    val g = diamond
    assert(g.outNeighbors(0).sorted == Seq(1, 2))
    assert(g.outNeighbors(3).isEmpty)
  }

  test("in-neighbors are correct") {
    val g = diamond
    assert(g.inNeighbors(3).sorted == Seq(1, 2))
    assert(g.inNeighbors(0).isEmpty)
  }

  test("self-loops are dropped") {
    val g = DiGraph.unweighted(3, Seq((0, 0), (0, 1), (1, 1), (1, 2)))
    assert(g.numEdges == 2)
    assert(g.outNeighbors(0) == Seq(1))
  }

  test("parallel edges are preserved with multiplicity") {
    val g = DiGraph.unweighted(2, Seq((0, 1), (0, 1), (0, 1)))
    assert(g.numEdges == 3)
    assert(g.outDegree(0) == 3)
    assert(g.inDegree(1) == 3)
  }

  test("edge weights align with in-neighbor index") {
    val g = DiGraph.fromEdges(3, Seq((0, 2, 5.0), (1, 2, 7.0)))
    val inN = g.inNeighbors(2)
    val pairs = inN.indices.map(i => (inN(i), g.inWeight(2, i))).toSet
    assert(pairs == Set((0, 5.0), (1, 7.0)))
  }

  test("edge weights align with out-neighbor index") {
    val g = DiGraph.fromEdges(3, Seq((0, 1, 2.5), (0, 2, 3.5)))
    val outN = g.outNeighbors(0)
    val pairs = outN.indices.map(i => (outN(i), g.outWeight(0, i))).toSet
    assert(pairs == Set((1, 2.5), (2, 3.5)))
  }

  test("foreachEdge visits every edge exactly once") {
    val g = diamond
    var seen = Set.empty[(Int, Int)]
    var count = 0
    g.foreachEdge { (u, v, _) => seen += ((u, v)); count += 1 }
    assert(count == 4)
    assert(seen == Set((0, 1), (0, 2), (1, 3), (2, 3)))
  }

  test("edges returns the full edge list") {
    val g = DiGraph.fromEdges(2, Seq((0, 1, 9.0)))
    assert(g.edges == Seq((0, 1, 9.0)))
  }

  test("out-of-range endpoints are rejected") {
    intercept[IllegalArgumentException] { DiGraph.unweighted(2, Seq((0, 2))) }
    intercept[IllegalArgumentException] { DiGraph.unweighted(2, Seq((-1, 0))) }
  }

  test("relabel preserves topology under a permutation") {
    val g  = diamond
    val g2 = g.relabel(Array(3, 2, 1, 0)) // v -> 3-v
    assert(g2.numEdges == 4)
    val expect = Set((3, 2), (3, 1), (2, 0), (1, 0))
    assert(g2.edges.map { case (u, v, _) => (u, v) }.toSet == expect)
  }

  test("relabel keeps degree multiset") {
    val g    = GraphGen.erdosRenyi(50, 200, seed = 7)
    val perm = GraphGen.randomPermutation(50, seed = 8)
    val g2   = g.relabel(perm)
    assert(g.edges.map(_._1).groupBy(identity).values.map(_.size).toSeq.sorted ==
           g2.edges.map(_._1).groupBy(identity).values.map(_.size).toSeq.sorted)
    (0 until 50).foreach { v =>
      assert(g2.outDegree(perm(v)) == g.outDegree(v))
      assert(g2.inDegree(perm(v)) == g.inDegree(v))
    }
  }

  test("relabel rejects wrong-size permutation") {
    intercept[IllegalArgumentException] { diamond.relabel(Array(0, 1)) }
  }

  test("edgesDF round-trips through fromDF") {
    val g   = DiGraph.fromEdges(4, Seq((0, 1, 2.0), (1, 2, 3.0), (2, 3, 4.0)))
    val df  = g.edgesDF(spark)
    val g2  = DiGraph.fromDF(df, 4)
    assert(g2.edges.sortBy(e => (e._1, e._2)) == g.edges.sortBy(e => (e._1, e._2)))
  }

  test("edgesDF schema is (src, dst, weight)") {
    val df = diamond.edgesDF(spark)
    assert(df.columns.toSeq == Seq("src", "dst", "weight"))
    assert(df.count() == 4)
  }

  test("edgesDF degree query matches DuckDB oracle") {
    import org.apache.spark.sql.functions._
    val g  = GraphGen.erdosRenyi(30, 120, seed = 3)
    val df = g.edgesDF(spark)
    val outDeg = df.groupBy("src").agg(count(lit(1)).as("out_deg"))
    repro.Oracle.assertEquivalent(
      outDeg,
      "SELECT src, count(*) AS out_deg FROM edges GROUP BY src",
      "edges" -> df)
  }
}
