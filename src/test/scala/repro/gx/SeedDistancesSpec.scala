package repro.gx

import scala.util.Random
import repro.SparkSpec
import repro.core.{GEdge, InMemoryGraph, PropertyGraph}
import repro.ctp.{CtpEvalConfig, GamEngine, GamVariant, NodeSeeds}

/** GraphX Pregel multi-source BFS vs a reference BFS, and soundness of
  * the feasibility pruning (pruned search = unpruned search results).
  */
class SeedDistancesSpec extends SparkSpec {

  private def mkGraph(edges: Seq[(Long, Long)]): (PropertyGraph, InMemoryGraph) = {
    val es = edges.zipWithIndex.map { case ((a, b), i) => GEdge(i.toLong, a, "r", b) }
    val ns = es.flatMap(e => Seq(e.src, e.dst)).distinct
    (PropertyGraph.fromEdges(spark, es), InMemoryGraph.fromSeqs(ns, es))
  }

  /** Reference BFS on the driver (undirected or directed). */
  private def refBfs(g: InMemoryGraph, sources: Seq[Long], maxDepth: Int,
                     directed: Boolean): Map[Long, Int] = {
    val dist = collection.mutable.HashMap.empty[Int, Int]
    var frontier = sources.map(g.nodeIndex).filter(_ >= 0)
    frontier.foreach(dist(_) = 0)
    var d = 0
    while (frontier.nonEmpty && d < maxDepth) {
      d += 1
      frontier = frontier.flatMap { n =>
        g.adj(n).flatMap { e =>
          val forward = g.esrc(e) == n
          if (directed && !forward) None
          else {
            val o = g.other(e, n)
            if (!dist.contains(o)) { dist(o) = d; Some(o) } else None
          }
        }
      }.distinct
    }
    dist.map { case (k, v) => g.nodeIds(k) -> v }.toMap
  }

  test("undirected distances match reference BFS on a path") {
    val (pg, mem) = mkGraph(Seq((0L, 1L), (1L, 2L), (2L, 3L), (3L, 4L)))
    val d = SeedDistances.compute(spark, pg, Seq(Seq(0L), Seq(4L)), maxDepth = 10)
    val ref0 = refBfs(mem, Seq(0L), 10, directed = false)
    val ref1 = refBfs(mem, Seq(4L), 10, directed = false)
    d.foreach { case (id, arr) =>
      assert(arr(0) == ref0.getOrElse(id, SeedDistances.Unreachable), s"node $id set 0")
      assert(arr(1) == ref1.getOrElse(id, SeedDistances.Unreachable), s"node $id set 1")
    }
  }

  test("directed mode follows edge orientation only") {
    val (pg, _) = mkGraph(Seq((0L, 1L), (2L, 1L)))
    val d = SeedDistances.compute(spark, pg, Seq(Seq(0L)), maxDepth = 5, directed = true)
    assert(d(1L)(0) == 1)
    assert(d(2L)(0) == SeedDistances.Unreachable) // 2 -> 1 cannot be walked backwards
    val du = SeedDistances.compute(spark, pg, Seq(Seq(0L)), maxDepth = 5)
    assert(du(2L)(0) == 2)
  }

  test("multi-node seed sets take the min distance") {
    val (pg, mem) = mkGraph(Seq((0L, 1L), (1L, 2L), (2L, 3L), (3L, 4L), (4L, 5L)))
    val d = SeedDistances.compute(spark, pg, Seq(Seq(0L, 5L)), maxDepth = 10)
    val ref = refBfs(mem, Seq(0L, 5L), 10, directed = false)
    d.foreach { case (id, arr) => assert(arr(0) == ref(id), s"node $id") }
  }

  test("random graphs: Pregel distances equal reference BFS") {
    val rnd = new Random(31)
    for (trial <- 1 to 5) {
      val n = 12
      val edges = (0 until 20).map { _ =>
        (rnd.nextInt(n).toLong, rnd.nextInt(n).toLong)
      }.filter(e => e._1 != e._2)
      val (pg, mem) = mkGraph(edges)
      val sets = Seq(Seq(0L), Seq((n - 1).toLong, 1L))
      val d = SeedDistances.compute(spark, pg, sets, maxDepth = 6)
      sets.zipWithIndex.foreach { case (srcs, i) =>
        val ref = refBfs(mem, srcs, 6, directed = false)
        d.foreach { case (id, arr) =>
          assert(arr(i) == ref.getOrElse(id, SeedDistances.Unreachable),
            s"trial $trial node $id set $i")
        }
      }
    }
  }

  test("feasibleNodeFilter keeps exactly the nodes within range of every set") {
    val (pg, mem) = mkGraph(Seq((0L, 1L), (1L, 2L), (2L, 3L), (3L, 4L), (2L, 5L)))
    val d = SeedDistances.compute(spark, pg, Seq(Seq(0L), Seq(4L)), maxDepth = 4)
    val keep = SeedDistances.feasibleNodeFilter(mem, d, Array(true, true), maxEdges = 4)
    // Node 5 is 3 hops from 0 and 3 hops from 4, total path through it
    // exceeds nothing individually — it stays; with maxEdges=2 all
    // mid-nodes fall out.
    assert(keep.count(identity) == mem.numNodes)
    val keep2 = SeedDistances.feasibleNodeFilter(mem, d, Array(true, true), maxEdges = 2)
    assert(!keep2(mem.nodeIndex(0L)) || !keep2(mem.nodeIndex(4L)) || keep2.count(identity) < mem.numNodes)
  }

  test("pruning preserves MoLESP results under MAX (soundness end-to-end)") {
    val rnd = new Random(32)
    for (trial <- 1 to 4) {
      val n = 10
      val edges = (0 until 16).map { _ =>
        (rnd.nextInt(n).toLong, rnd.nextInt(n).toLong)
      }.filter(e => e._1 != e._2)
      val (pg, mem) = mkGraph(edges)
      val sets = Seq(Seq(0L), Seq((n - 1).toLong))
      val maxEdges = 4
      val cfg = CtpEvalConfig(maxEdges = maxEdges)
      val pruned = SeedDistances.pruneForCtp(spark, pg, mem, sets, maxEdges)
      val full = GamEngine.run(mem, sets.map(NodeSeeds(_)), cfg, GamVariant.MoLESP)
      val fast = GamEngine.run(pruned, sets.map(NodeSeeds(_)), cfg, GamVariant.MoLESP)
      assert(fast.resultKeys == full.resultKeys, s"trial $trial")
      assert(pruned.numNodes <= mem.numNodes)
    }
  }
}
