package repro.partition

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{DiGraph, GraphGen}

class PartitionersSpec extends AnyFunSuite {

  private val all: Seq[Partitioner] = Seq(RabbitPartition, Louvain, MetisLike, Fennel)

  private def communityGraph(nComm: Int, size: Int, intra: Int, seed: Long): DiGraph = {
    val rnd = new scala.util.Random(seed)
    val es = scala.collection.mutable.ArrayBuffer.empty[(Int, Int)]
    (0 until nComm).foreach { c =>
      val base = c * size
      (0 until intra).foreach { _ =>
        val u = base + rnd.nextInt(size); val v = base + rnd.nextInt(size)
        if (u != v) es += ((u, v))
      }
      es += ((base, ((c + 1) % nComm) * size))
    }
    DiGraph.unweighted(nComm * size, es.toSeq)
  }

  test("every partitioner returns dense labels covering all vertices") {
    val g = GraphGen.rmat(200, 1400, seed = 50)
    all.foreach { p =>
      val labels = p.partition(g, 8)
      assert(labels.length == 200, s"${p.name} wrong length")
      val k = labels.max + 1
      assert(labels.min == 0, s"${p.name} labels must start at 0")
      assert(labels.toSet == (0 until k).toSet, s"${p.name} labels must be dense")
    }
  }

  test("every partitioner handles the empty graph") {
    val g = DiGraph.unweighted(0, Seq.empty)
    all.foreach(p => assert(p.partition(g, 4).isEmpty, p.name))
  }

  test("every partitioner handles an edgeless graph") {
    val g = DiGraph.unweighted(5, Seq.empty)
    all.foreach { p =>
      val labels = p.partition(g, 2)
      assert(labels.length == 5, p.name)
    }
  }

  test("every partitioner is deterministic") {
    val g = GraphGen.rmat(150, 1000, seed = 51)
    all.foreach { p =>
      assert(p.partition(g, 4).toSeq == p.partition(g, 4).toSeq, p.name)
    }
  }

  test("community methods recover planted communities (most edges internal)") {
    val g = communityGraph(nComm = 5, size = 30, intra = 200, seed = 52)
    Seq(RabbitPartition, Louvain).foreach { p =>
      val labels = p.partition(g, 5)
      val frac = Partitioner.internalEdges(g, labels).toDouble / g.numEdges
      assert(frac > 0.8, s"${p.name} internal edge fraction $frac too low")
    }
  }

  test("balanced methods produce near-balanced part sizes") {
    val g = GraphGen.rmat(400, 2400, seed = 53)
    Seq(MetisLike, Fennel).foreach { p =>
      val labels = p.partition(g, 4)
      val sizes = labels.groupBy(identity).values.map(_.length)
      assert(sizes.max <= 1.5 * 400 / 4, s"${p.name} sizes $sizes unbalanced")
    }
  }

  test("MetisLike honors the requested k") {
    val g = GraphGen.rmat(256, 1600, seed = 54)
    val labels = MetisLike.partition(g, 8)
    assert(labels.max + 1 == 8)
  }

  test("Fennel honors the requested k on a connected graph") {
    val g = GraphGen.rmat(256, 2000, seed = 55)
    val labels = Fennel.partition(g, 4)
    assert(labels.max + 1 <= 4 && labels.max + 1 >= 2)
  }

  test("Fennel with k=1 puts everything in one part") {
    val g = GraphGen.rmat(50, 300, seed = 56)
    assert(Fennel.partition(g, 1).forall(_ == 0))
  }

  test("community methods beat Fennel on internal-edge fraction for community graphs") {
    val g0 = communityGraph(nComm = 6, size = 25, intra = 150, seed = 57)
    val g  = GraphGen.shuffleIds(g0, seed = 58) // defeat Fennel's streaming prefix advantage
    val rabbitFrac = Partitioner.internalEdges(g, RabbitPartition.partition(g, 6)).toDouble / g.numEdges
    val fennelFrac = Partitioner.internalEdges(g, Fennel.partition(g, 6)).toDouble / g.numEdges
    assert(rabbitFrac > fennelFrac,
      s"Rabbit ($rabbitFrac) should keep more edges internal than streaming Fennel ($fennelFrac)")
  }

  test("compact produces dense first-seen labels") {
    assert(Partitioner.compact(Array(7, 7, 3, 7, 9)).toSeq == Seq(0, 0, 1, 0, 2))
  }

  test("internalEdges counts same-partition edges") {
    val g = DiGraph.unweighted(4, Seq((0, 1), (1, 2), (2, 3)))
    assert(Partitioner.internalEdges(g, Array(0, 0, 1, 1)) == 2L)
  }

  test("numParts of a dense labeling") {
    assert(Partitioner.numParts(Array(0, 1, 2, 1)) == 3)
    assert(Partitioner.numParts(Array.empty[Int]) == 0)
  }

  test("RabbitPartition on a single strongly connected community returns few parts") {
    val g = communityGraph(nComm = 1, size = 30, intra = 300, seed = 59)
    val labels = RabbitPartition.partition(g, 1)
    assert(labels.max + 1 <= 3, s"expected at most a few communities, got ${labels.max + 1}")
  }
}
