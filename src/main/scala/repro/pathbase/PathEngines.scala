package repro.pathbase

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.{IntegerType, LongType, StringType, StructField, StructType}

/** DataFrame-based path query engines: the stand-ins for the paper's
  * §5.5 baselines, all expressed as iterative Catalyst plans.
  *
  *  - [[reachablePairs]]   ≈ Virtuoso SPARQL 1.1 property paths: checks
  *    which (src,dst) pairs are connected by a directed path, without
  *    returning the paths (label-constrained or not ≈ Virtuoso-SQL).
  *  - [[enumeratePaths]]   ≈ Postgres `WITH RECURSIVE` / JEDI: returns
  *    every directed (or undirected ≈ Neo4j) *simple* path, with its
  *    node and edge-id sequences.
  *  - [[stitchTrees]]      ≈ the path-stitching approach of §2 for m=3:
  *    a join of two path sets on their common root; produces duplicated,
  *    possibly non-tree combinations — exactly the semantic gap the
  *    paper describes.
  *
  * Every iteration ends in `localCheckpoint()`: with iterative frames,
  * letting the lineage/plan grow makes Catalyst analysis time explode
  * long before the data does.
  */
object PathEngines {

  /** Normalizes the traversal relation: (from, to, eid) rows, label-
    * filtered, optionally symmetrized for undirected traversal.
    */
  private def traversal(edges: DataFrame, labels: Option[Set[String]],
                        undirected: Boolean): DataFrame = {
    var e = edges
    labels.foreach(ls => e = e.filter(col("label").isin(ls.toSeq: _*)))
    val fwd = e.select(col("src") as "from", col("dst") as "to", col("id") as "eid")
    val rel =
      if (!undirected) fwd
      else fwd.union(e.select(col("dst") as "from", col("src") as "to", col("id") as "eid"))
    rel.localCheckpoint()
  }

  private def emptyPathsDf(spark: SparkSession): DataFrame =
    spark.createDataFrame(spark.sparkContext.emptyRDD[org.apache.spark.sql.Row],
      StructType(Seq(
        StructField("start", LongType), StructField("end", LongType),
        StructField("len", IntegerType), StructField("nodePath", StringType),
        StructField("edgePath", StringType))))

  /** All simple paths of 1..maxLen edges from a `srcs` node to a `dsts`
    * node.
    *
    * @param srcs single-column DataFrame `start` of source node ids
    * @param dsts single-column DataFrame `end` of target node ids
    * @return DataFrame(start, end, len, nodePath, edgePath) — paths as
    *         comma-joined id strings
    */
  def enumeratePaths(spark: SparkSession, edges: DataFrame, srcs: DataFrame,
                     dsts: DataFrame, maxLen: Int,
                     labels: Option[Set[String]] = None,
                     undirected: Boolean = false): DataFrame = {
    val rel = traversal(edges, labels, undirected)
    val targets = dsts.select(col("end")).distinct().localCheckpoint()
    var frontier = srcs.select(col("start")).distinct().select(
      col("start"), col("start") as "cur",
      array(col("start")) as "nodes", array().cast("array<long>") as "eids")
      .localCheckpoint()
    val resultParts = collection.mutable.ArrayBuffer.empty[DataFrame]
    var depth = 0
    var frontierCount = frontier.count()
    while (depth < maxLen && frontierCount > 0) {
      depth += 1
      val next = frontier
        .join(rel, frontier("cur") === rel("from"))
        .filter(!array_contains(col("nodes"), col("to"))) // simple paths only
        .select(col("start"), col("to") as "cur",
          concat(col("nodes"), array(col("to"))) as "nodes",
          concat(col("eids"), array(col("eid"))) as "eids")
        .localCheckpoint() // materializes; keeps plan depth constant
      val matched = next
        .join(targets, next("cur") === targets("end"))
        .select(col("start"), col("cur") as "end", lit(depth) as "len",
          concat_ws(",", col("nodes")) as "nodePath",
          concat_ws(",", col("eids")) as "edgePath")
      resultParts += matched
      frontier = next
      frontierCount = next.count()
    }
    if (resultParts.isEmpty) emptyPathsDf(spark)
    else resultParts.reduce(_ union _).localCheckpoint()
  }

  /** Which (start, end) pairs are connected by a directed path of at
    * most maxLen edges — existence only, no paths returned (the
    * Virtuoso-shaped baseline). BFS over node pairs with per-level
    * dedup, so it stays polynomial where path enumeration explodes.
    */
  def reachablePairs(spark: SparkSession, edges: DataFrame, srcs: DataFrame,
                     dsts: DataFrame, maxLen: Int,
                     labels: Option[Set[String]] = None,
                     undirected: Boolean = false): DataFrame = {
    val rel = traversal(edges, labels, undirected)
      .select(col("from"), col("to")).distinct().localCheckpoint()
    val targets = dsts.select(col("end")).distinct().localCheckpoint()
    var visited = srcs.select(col("start")).distinct()
      .select(col("start"), col("start") as "cur").localCheckpoint()
    var frontier = visited
    val resultParts = collection.mutable.ArrayBuffer.empty[DataFrame]
    var depth = 0
    var frontierCount = frontier.count()
    while (depth < maxLen && frontierCount > 0) {
      depth += 1
      val grown = frontier.join(rel, frontier("cur") === rel("from"))
        .select(col("start"), col("to") as "cur").distinct()
      val next = grown.except(visited).localCheckpoint()
      resultParts += next.join(targets, next("cur") === targets("end"))
        .select(col("start"), col("cur") as "end")
      visited = visited.union(next).localCheckpoint()
      frontier = next
      frontierCount = next.count()
    }
    if (resultParts.isEmpty)
      spark.createDataFrame(spark.sparkContext.emptyRDD[org.apache.spark.sql.Row],
        StructType(Seq(StructField("start", LongType), StructField("end", LongType))))
    else resultParts.reduce(_ union _).distinct().localCheckpoint()
  }

  /** Path stitching for a 3-set CTP whose first set contains the common
    * root (the CDF m=3 shape): joins root→S2 paths with root→S3 paths on
    * the root. No deduplication or minimization is applied — mirroring
    * how the paper times the baselines.
    */
  def stitchTrees(spark: SparkSession, edges: DataFrame, roots: DataFrame,
                  set2: DataFrame, set3: DataFrame, maxLen: Int,
                  labels: Option[Set[String]] = None): DataFrame = {
    val p2 = enumeratePaths(spark, edges, roots, set2, maxLen, labels)
      .select(col("start"), col("end") as "end2", col("edgePath") as "path2")
    val p3 = enumeratePaths(spark, edges, roots, set3, maxLen, labels)
      .select(col("start"), col("end") as "end3", col("edgePath") as "path3")
    p2.join(p3, "start")
  }
}
