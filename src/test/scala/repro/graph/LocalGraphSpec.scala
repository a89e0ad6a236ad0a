package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class LocalGraphSpec extends AnyFunSuite {

  private def triangle: LocalGraph = LocalGraph(Seq(1L, 2L, 3L), Seq((1L, 2L), (2L, 3L), (1L, 3L)))

  test("empty graph has no nodes or edges") {
    val g = LocalGraph(Nil, Nil)
    assert(g.numNodes == 0)
    assert(g.numEdges == 0)
  }

  test("nodes are sorted and indexed densely") {
    val g = LocalGraph(Seq(30L, 10L, 20L), Nil)
    assert(g.nodeIds.toSeq == Seq(10L, 20L, 30L))
    assert(g.index(10L) == 0 && g.index(20L) == 1 && g.index(30L) == 2)
  }

  test("duplicate nodes are collapsed") {
    val g = LocalGraph(Seq(1L, 1L, 2L), Nil)
    assert(g.numNodes == 2)
  }

  test("triangle has 3 edges and degree 2 everywhere") {
    val g = triangle
    assert(g.numEdges == 3)
    (0 until 3).foreach(i => assert(g.degree(i) == 2))
  }

  test("addEdge ignores self loops") {
    val g = LocalGraph(Seq(1L, 2L), Nil)
    g.addEdge(0, 0)
    assert(g.numEdges == 0)
  }

  test("addEdge ignores duplicates") {
    val g = LocalGraph(Seq(1L, 2L), Seq((1L, 2L), (2L, 1L), (1L, 2L)))
    assert(g.numEdges == 1)
  }

  test("edges with endpoints outside node set are dropped") {
    val g = LocalGraph(Seq(1L, 2L), Seq((1L, 2L), (1L, 99L), (98L, 97L)))
    assert(g.numEdges == 1)
  }

  test("removeEdge removes both directions") {
    val g = triangle
    g.removeEdge(0, 1)
    assert(g.numEdges == 2)
    assert(!g.hasEdge(0, 1) && !g.hasEdge(1, 0))
  }

  test("removeEdge on absent edge is a no-op") {
    val g = LocalGraph(Seq(1L, 2L, 3L), Seq((1L, 2L)))
    g.removeEdge(0, 2)
    assert(g.numEdges == 1)
  }

  test("copy is independent of the original") {
    val g = triangle
    val c = g.copy()
    g.removeEdge(0, 1)
    assert(c.numEdges == 3)
    assert(g.numEdges == 2)
  }

  test("connectedComponents on a connected graph is all zero") {
    assert(triangle.connectedComponents().toSeq == Seq(0, 0, 0))
  }

  test("connectedComponents separates two cliques") {
    val g = LocalGraph(Seq(1L, 2L, 3L, 4L), Seq((1L, 2L), (3L, 4L)))
    val c = g.connectedComponents()
    assert(c(0) == c(1) && c(2) == c(3) && c(0) != c(2))
  }

  test("isolated nodes are their own components") {
    val g = LocalGraph(Seq(1L, 2L, 3L), Seq((1L, 2L)))
    val c = g.connectedComponents()
    assert(c(2) != c(0))
  }

  test("edgeList returns canonical sorted-index pairs") {
    val g = triangle
    assert(g.edgeList().toSet == Set((0, 1), (0, 2), (1, 2)))
  }

  test("edgeList reflects removals") {
    val g = triangle
    g.removeEdge(1, 2)
    assert(g.edgeList().toSet == Set((0, 1), (0, 2)))
  }

  test("random graph: handshake lemma holds") {
    val rng = new Random(1)
    val n = 40
    val nodes = (0 until n).map(_.toLong)
    val edges = (0 until 200).map(_ => (rng.nextInt(n).toLong, rng.nextInt(n).toLong))
    val g = LocalGraph(nodes, edges)
    val degSum = (0 until n).map(g.degree).sum
    assert(degSum == 2 * g.numEdges)
  }

  test("neighbors are symmetric") {
    val rng = new Random(2)
    val nodes = (0 until 20).map(_.toLong)
    val edges = (0 until 50).map(_ => (rng.nextInt(20).toLong, rng.nextInt(20).toLong))
    val g = LocalGraph(nodes, edges)
    (0 until 20).foreach { i =>
      g.neighbors(i).foreach(j => assert(g.neighbors(j).exists(_ == i)))
    }
  }
}
