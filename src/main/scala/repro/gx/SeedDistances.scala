package repro.gx

import org.apache.spark.graphx.{Edge, EdgeTriplet, Graph, Pregel, VertexId, EdgeDirection}
import org.apache.spark.sql.SparkSession
import repro.core.{InMemoryGraph, PropertyGraph}

/** Distributed multi-source BFS over the graph edges (GraphX Pregel).
  *
  * For each vertex, computes the minimum number of edges to reach *some*
  * seed of each seed set — traversing edges in both directions by
  * default (requirement R3), or only forward in `directed` mode (UNI).
  *
  * This is the distributed-pruning substrate: a node can only appear in
  * a CTP result if it reaches every concrete seed set, and in a result
  * of ≤ MAX edges only if every such distance is ≤ MAX (any tree
  * containing node v and a seed s contains the tree path v⇝s, which is
  * at least dist(v, s) edges long). [[feasibleNodeFilter]] applies this
  * bound so the driver-side search (§5.1 loads the graph in memory) only
  * sees the feasible neighborhood.
  */
object SeedDistances {

  val Unreachable: Int = Int.MaxValue

  /** Per-vertex distances to each of the m seed sets, via GraphX Pregel.
    *
    * @param pg       graph as DataFrames
    * @param seedSets external node ids per seed set
    * @param maxDepth BFS horizon (iterations); distances beyond stay
    *                 [[Unreachable]]
    * @param directed true: follow edge direction only (src→dst); false:
    *                 both directions
    * @return map external node id → array of m distances
    */
  def compute(spark: SparkSession, pg: PropertyGraph, seedSets: Seq[Seq[Long]],
              maxDepth: Int, directed: Boolean = false): Map[Long, Array[Int]] = {
    val m = seedSets.size
    val seedOf: Map[Long, Array[Int]] = {
      val init = collection.mutable.HashMap.empty[Long, Array[Int]]
      seedSets.zipWithIndex.foreach { case (set, i) =>
        set.foreach { id =>
          val a = init.getOrElseUpdate(id, Array.fill(m)(Unreachable))
          a(i) = 0
        }
      }
      init.toMap
    }
    val bcSeeds = spark.sparkContext.broadcast(seedOf)

    val edgeRdd = pg.edges.select("src", "dst").rdd
      .map(r => Edge(r.getLong(0), r.getLong(1), ()))
    val vertRdd = pg.nodes.select("id").rdd
      .map(r => (r.getLong(0): VertexId, ()))
    val graph: Graph[Array[Int], Unit] =
      Graph(vertRdd, edgeRdd, ())
        .mapVertices((id, _) => bcSeeds.value.getOrElse(id, Array.fill(m)(Unreachable)))

    def mergeDist(a: Array[Int], b: Array[Int]): Array[Int] = {
      val out = new Array[Int](a.length)
      var i = 0
      while (i < a.length) { out(i) = math.min(a(i), b(i)); i += 1 }
      out
    }
    def bump(a: Array[Int]): Array[Int] = a.map(d => if (d == Unreachable) d else d + 1)
    def improves(cur: Array[Int], msg: Array[Int]): Boolean = {
      var i = 0
      while (i < cur.length) { if (msg(i) < cur(i)) return true; i += 1 }
      false
    }

    val result = Pregel(
      graph,
      initialMsg = Array.fill(m)(Unreachable),
      maxIterations = maxDepth,
      activeDirection = EdgeDirection.Either,
    )(
      vprog = (_, attr, msg) => mergeDist(attr, msg),
      sendMsg = (t: EdgeTriplet[Array[Int], Unit]) => {
        val fwd = bump(t.srcAttr)
        val bwd = bump(t.dstAttr)
        val toDst = if (improves(t.dstAttr, fwd)) Iterator((t.dstId, fwd)) else Iterator.empty
        val toSrc =
          if (!directed && improves(t.srcAttr, bwd)) Iterator((t.srcId, bwd))
          else Iterator.empty
        toDst ++ toSrc
      },
      mergeMsg = mergeDist,
    )
    val out = result.vertices.collect().map { case (id, d) => (id, d) }.toMap
    bcSeeds.destroy()
    out
  }

  /** Sound node-level pruning: node v may appear in some result of size
    * ≤ `maxEdges` only if dist(v, S_i) ≤ maxEdges for every concrete set
    * i. Returns the keep-mask over the dense node indices of `g`.
    */
  def feasibleNodeFilter(g: InMemoryGraph, dists: Map[Long, Array[Int]],
                         concrete: Array[Boolean], maxEdges: Int): Array[Boolean] = {
    val keep = new Array[Boolean](g.numNodes)
    var i = 0
    while (i < g.numNodes) {
      val d = dists.get(g.nodeIds(i))
      keep(i) = d.exists { arr =>
        var ok = true
        var j = 0
        while (j < arr.length && ok) {
          if (concrete(j) && arr(j) > maxEdges) ok = false
          j += 1
        }
        ok
      }
      i += 1
    }
    keep
  }

  /** Convenience: compute distances with Pregel and restrict `g` to the
    * feasible sub-multigraph for a MAX-`maxEdges` CTP over `seedSets`.
    */
  def pruneForCtp(spark: SparkSession, pg: PropertyGraph, g: InMemoryGraph,
                  seedSets: Seq[Seq[Long]], maxEdges: Int,
                  directed: Boolean = false): InMemoryGraph = {
    val d = compute(spark, pg, seedSets, maxDepth = maxEdges, directed = directed)
    val concrete = seedSets.map(_ => true).toArray
    g.inducedSubgraph(feasibleNodeFilter(g, d, concrete, maxEdges))
  }
}
