package repro.pathbase

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.{GEdge, PropertyGraph}

/** Path-engine baselines vs DuckDB's real `WITH RECURSIVE` (the Oracle):
  * same directed simple paths, same reachable pairs; undirected mode and
  * stitching checked structurally.
  */
class PathEnginesSpec extends SparkSpec {

  private def edgesDf(es: Seq[(Long, String, Long)]): DataFrame = {
    val ges = es.zipWithIndex.map { case ((a, l, b), i) => GEdge(i.toLong, a, l, b) }
    PropertyGraph.fromSeqs(spark, Seq.empty, ges).edges
  }

  private def idsDf(colName: String, ids: Seq[Long]): DataFrame = {
    import spark.implicits._
    ids.toDF(colName)
  }

  /** DuckDB recursive CTE enumerating the same directed simple paths. */
  private def duckPathsSql(maxLen: Int, labelFilter: Option[Set[String]]): String = {
    val lbl = labelFilter
      .map(ls => s"AND e.label IN (${ls.map(l => s"'$l'").mkString(",")})")
      .getOrElse("")
    s"""WITH RECURSIVE p(start, cur, nodes, eids, len) AS (
       |  SELECT s.start, s.start, '|' || s.start || '|', '', 0 FROM srcs s
       |  UNION ALL
       |  SELECT p.start, e.dst, p.nodes || e.dst || '|',
       |         CASE WHEN p.eids = '' THEN e.id ELSE p.eids || ',' || e.id END,
       |         p.len + 1
       |  FROM p, edges e
       |  WHERE e.src = p.cur AND p.len < $maxLen
       |    AND p.nodes NOT LIKE '%|' || e.dst || '|%' $lbl
       |)
       |SELECT p.start AS start, p.cur AS stop, p.len AS len, p.eids AS edgePath
       |FROM p JOIN dsts d ON d.stop = p.cur WHERE p.len >= 1""".stripMargin
  }

  private val sample = Seq(
    (0L, "a", 1L), (1L, "a", 2L), (0L, "b", 3L), (3L, "a", 2L),
    (2L, "c", 4L), (1L, "b", 3L), (4L, "a", 0L))

  test("directed path enumeration matches DuckDB WITH RECURSIVE") {
    val e = edgesDf(sample)
    val out = PathEngines.enumeratePaths(spark, e, idsDf("start", Seq(0L)),
      idsDf("end", Seq(2L, 4L)), maxLen = 4)
      .select(col("start"), col("end") as "stop", col("len"), col("edgePath"))
    Oracle.assertEquivalent(out, duckPathsSql(4, None),
      "edges" -> e, "srcs" -> idsDf("start", Seq(0L)), "dsts" -> idsDf("stop", Seq(2L, 4L)))
  }

  test("label-constrained enumeration matches DuckDB") {
    val e = edgesDf(sample)
    val out = PathEngines.enumeratePaths(spark, e, idsDf("start", Seq(0L)),
      idsDf("end", Seq(2L)), maxLen = 4, labels = Some(Set("a")))
      .select(col("start"), col("end") as "stop", col("len"), col("edgePath"))
    Oracle.assertEquivalent(out, duckPathsSql(4, Some(Set("a"))),
      "edges" -> e, "srcs" -> idsDf("start", Seq(0L)), "dsts" -> idsDf("stop", Seq(2L)))
  }

  test("simple-path constraint: cycles are not traversed") {
    // 0 -> 1 -> 0 cycle plus 1 -> 2: only 2 paths from 0 to 2 at len<=10? no - one.
    val e = edgesDf(Seq((0L, "a", 1L), (1L, "a", 0L), (1L, "a", 2L)))
    val out = PathEngines.enumeratePaths(spark, e, idsDf("start", Seq(0L)),
      idsDf("end", Seq(2L)), maxLen = 10)
    assert(out.count() == 1)
  }

  test("undirected mode finds reverse-edge paths") {
    val e = edgesDf(Seq((1L, "a", 0L), (1L, "a", 2L)))
    val directed = PathEngines.enumeratePaths(spark, e, idsDf("start", Seq(0L)),
      idsDf("end", Seq(2L)), maxLen = 4)
    assert(directed.count() == 0)
    val undirected = PathEngines.enumeratePaths(spark, e, idsDf("start", Seq(0L)),
      idsDf("end", Seq(2L)), maxLen = 4, undirected = true)
    assert(undirected.count() == 1)
  }

  test("reachablePairs agrees with path enumeration on reachability") {
    val e = edgesDf(sample)
    val srcs = idsDf("start", Seq(0L, 1L, 3L))
    val dsts = idsDf("end", Seq(2L, 4L))
    val viaPaths = PathEngines.enumeratePaths(spark, e, srcs, dsts, maxLen = 5)
      .select("start", "end").distinct().collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSet
    val pairs = PathEngines.reachablePairs(spark, e, srcs, dsts, maxLen = 5)
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(pairs == viaPaths)
  }

  test("reachablePairs is cheap on a graph where enumeration explodes") {
    // Chain of diamonds: 2^8 paths but reachability stays linear.
    val es = (0 until 8).flatMap { i =>
      val a = 2L * i; val m1 = 2L * i + 1; val m2 = 100L + i; val b = 2L * (i + 1)
      Seq((a, "r", m1), (m1, "r", b), (a, "r", m2), (m2, "r", b))
    }
    val e = edgesDf(es)
    val pairs = PathEngines.reachablePairs(spark, e, idsDf("start", Seq(0L)),
      idsDf("end", Seq(16L)), maxLen = 16)
    assert(pairs.count() == 1)
  }

  test("stitchTrees joins the two path sets on the shared root") {
    // Y: 0 -> 1 -> 2 and 1 -> 3 (root candidates = {0}); stem shared.
    val e = edgesDf(Seq((0L, "x", 1L), (1L, "x", 2L), (1L, "x", 3L)))
    val stitched = PathEngines.stitchTrees(spark, e, idsDf("start", Seq(0L)),
      idsDf("end", Seq(2L)), idsDf("end", Seq(3L)), maxLen = 3)
    val rows = stitched.collect()
    assert(rows.length == 1)
    // The stitched "tree" repeats the stem edge 0->1 in both paths: the
    // §2 semantic mismatch (join of paths need not be a tree).
    val r = rows.head
    val p2 = r.getAs[String]("path2").split(',').toSet
    val p3 = r.getAs[String]("path3").split(',').toSet
    assert(p2.intersect(p3).nonEmpty)
  }

  test("random directed graphs match DuckDB WITH RECURSIVE (10 trials)") {
    val rnd = new scala.util.Random(77)
    for (trial <- 1 to 10) {
      val n = 4 + rnd.nextInt(3)
      val labels = Seq("a", "b")
      val es = (0 until 5 + rnd.nextInt(6)).map { _ =>
        val a = rnd.nextInt(n).toLong
        var b = rnd.nextInt(n).toLong
        while (b == a) b = rnd.nextInt(n).toLong
        (a, labels(rnd.nextInt(2)), b)
      }
      val e = edgesDf(es)
      val srcs = idsDf("start", Seq(0L, 1L))
      val dsts = idsDf("stop", Seq((n - 1).toLong, (n - 2).toLong))
      val out = PathEngines.enumeratePaths(spark, e, srcs,
        dsts.withColumnRenamed("stop", "end"), maxLen = 3)
        .select(col("start"), col("end") as "stop", col("len"), col("edgePath"))
      Oracle.assertEquivalent(out, duckPathsSql(3, None),
        "edges" -> e, "srcs" -> srcs, "dsts" -> dsts)
    }
  }

  test("empty sources yield empty results without failing") {
    val e = edgesDf(sample)
    assert(PathEngines.enumeratePaths(spark, e, idsDf("start", Seq.empty),
      idsDf("end", Seq(2L)), maxLen = 3).count() == 0)
    assert(PathEngines.reachablePairs(spark, e, idsDf("start", Seq.empty),
      idsDf("end", Seq(2L)), maxLen = 3).count() == 0)
  }
}
