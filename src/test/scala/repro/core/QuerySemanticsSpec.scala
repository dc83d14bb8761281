package repro.core

import org.apache.spark.sql.Row
import org.apache.spark.sql.types.{LongType, StringType, StructField, StructType}
import repro.{Oracle, SparkSpec}
import repro.ctp.{BruteForce, NodeSeeds}

/** Validates the §3 step (C) join/projection semantics (Def. 2.10)
  * against DuckDB: the CTP table (computed by the trusted BruteForce)
  * is loaded into DuckDB and the final natural join + head projection
  * is cross-checked.
  */
class QuerySemanticsSpec extends SparkSpec {

  private lazy val g = SampleGraph.pg(spark)

  test("step (C): Φ ⋈ CTP table ⋈ head projection matches DuckDB") {
    val q = EqlParser.parse(
      """(x, y, z, w) :- (type(x)="entrepreneur", "citizenOf", "USA"),
        |                (type(y)="entrepreneur", "citizenOf", "France"),
        |                (type(z)="politician", "citizenOf", "France"),
        |                (x, y, z, *w)""".stripMargin)
    val res = EqlEvaluator.evaluate(spark, g, q)

    // Trusted CTP table from the exhaustive oracle.
    val brute = BruteForce.run(SampleGraph.inMemory,
      Seq(NodeSeeds(Seq(2L, 4L)), NodeSeeds(Seq(3L, 6L)), NodeSeeds(Seq(9L))))
    val ctpRows = brute.results.map(t =>
      Row(t.seedIds(0), t.seedIds(1), t.seedIds(2), t.edgeIds.mkString(",")))
    val ctpDf = spark.createDataFrame(
      spark.sparkContext.parallelize(ctpRows),
      StructType(Seq(StructField("x", LongType), StructField("y", LongType),
        StructField("z", LongType), StructField("w", StringType))))

    // DuckDB evaluates the BGPs + joins the CTP table, per Def. 2.10.
    val sql =
      """SELECT DISTINCT c.x AS x, c.y AS y, c.z AS z, c.w AS w
        |FROM ctp c,
        |  edges ex, nodes nx, nodes cx,
        |  edges ey, nodes ny, nodes cy,
        |  edges ez, nodes nz, nodes cz
        |WHERE ex.src = nx.id AND nx.ntype = 'entrepreneur'
        |  AND ex.label = 'citizenOf' AND ex.dst = cx.id AND cx.label = 'USA'
        |  AND ey.src = ny.id AND ny.ntype = 'entrepreneur'
        |  AND ey.label = 'citizenOf' AND ey.dst = cy.id AND cy.label = 'France'
        |  AND ez.src = nz.id AND nz.ntype = 'politician'
        |  AND ez.label = 'citizenOf' AND ez.dst = cz.id AND cz.label = 'France'
        |  AND c.x = ex.src AND c.y = ey.src AND c.z = ez.src""".stripMargin
    Oracle.assertEquivalent(res.df, sql,
      "nodes" -> g.nodes, "edges" -> g.edges, "ctp" -> ctpDf)
  }

  test("head projection drops unrequested variables and dedups") {
    val q = EqlParser.parse(
      """(o) :- (a, "worksFor", o), (b, "worksFor", o)""")
    val rows = EqlEvaluator.evaluate(spark, g, q).df.collect().map(_.getLong(0)).toSeq
    assert(rows == Seq(7L)) // OrgC once, despite 4 (a,b) embeddings
  }

  test("cross-component queries build the cross product (Def. 2.10)") {
    val q = EqlParser.parse(
      """(x, y) :- (x, "founded", f), (y, "advises", p)""")
    val rows = EqlEvaluator.evaluate(spark, g, q).df.collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(rows == Set((4L, 3L))) // Carl founded x Alice advises
  }
}
