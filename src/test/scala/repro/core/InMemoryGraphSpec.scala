package repro.core

import org.scalatest.funsuite.AnyFunSuite

class InMemoryGraphSpec extends AnyFunSuite {

  private val g = InMemoryGraph.fromSeqs(
    Seq(10L, 20L, 30L, 40L, 99L), // 99 is isolated
    Seq(GEdge(0, 10, "a", 20), GEdge(1, 20, "b", 30), GEdge(2, 30, "a", 10),
      GEdge(3, 30, "c", 40)))

  test("dense reindexing round-trips external ids") {
    assert(g.numNodes == 5)
    assert(g.numEdges == 4)
    (Seq(10L, 20L, 30L, 40L, 99L)).foreach { id =>
      assert(g.nodeIds(g.nodeIndex(id)) == id)
    }
    assert(g.nodeIndex(12345L) == -1)
  }

  test("labels are interned and resolvable") {
    assert(g.labels.toSet == Set("a", "b", "c"))
    assert(g.labelId("a") >= 0)
    assert(g.labelId("zzz") == -1)
    assert(g.elabel(0) == g.elabel(2)) // both "a"
  }

  test("adjacency is bidirectional; degree counts incident edges") {
    val n30 = g.nodeIndex(30L)
    assert(g.degree(n30) == 3) // edges 1, 2, 3
    assert(g.degree(g.nodeIndex(99L)) == 0)
    val n10 = g.nodeIndex(10L)
    assert(g.adj(n10).toSet == Set(0, 2))
  }

  test("other() returns the opposite endpoint") {
    val n10 = g.nodeIndex(10L); val n20 = g.nodeIndex(20L)
    assert(g.other(0, n10) == n20)
    assert(g.other(0, n20) == n10)
  }

  test("inducedSubgraph keeps ids and drops cut edges") {
    val keep = Array.tabulate(g.numNodes)(i => g.nodeIds(i) != 40L)
    val sub = g.inducedSubgraph(keep)
    assert(sub.numNodes == 4)
    assert(sub.numEdges == 3) // edge 3 (30-40) dropped
    assert(sub.edgeIds.toSet == Set(0L, 1L, 2L))
    assert(sub.nodeIndex(40L) == -1)
    assert(sub.nodeIndex(10L) >= 0)
    // Adjacency still consistent in the subgraph.
    val n30 = sub.nodeIndex(30L)
    assert(sub.degree(n30) == 2)
  }

  test("self-loops are indexed once in adjacency") {
    val loop = InMemoryGraph.fromSeqs(Seq(1L), Seq(GEdge(0, 1, "l", 1)))
    assert(loop.degree(loop.nodeIndex(1L)) == 1)
  }

  test("fromPropertyGraph matches fromSeqs") {
    val spark = repro.SparkSpec.shared
    val pg = PropertyGraph.fromSeqs(spark,
      Seq(GNode(10, "x", ""), GNode(20, "y", ""), GNode(30, "z", ""),
        GNode(40, "w", ""), GNode(99, "iso", "")),
      Seq(GEdge(0, 10, "a", 20), GEdge(1, 20, "b", 30), GEdge(2, 30, "a", 10),
        GEdge(3, 30, "c", 40)))
    val g2 = InMemoryGraph.fromPropertyGraph(pg)
    assert(g2.numNodes == g.numNodes)
    assert(g2.numEdges == g.numEdges)
    assert(g2.nodeIds.sorted.toSeq == g.nodeIds.sorted.toSeq)
  }
}
