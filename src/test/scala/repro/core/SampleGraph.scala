package repro.core

import org.apache.spark.sql.SparkSession

/** A small heterogeneous graph modeled on the paper's Figure 1: typed
  * people (entrepreneurs, politicians) with citizenships, organizations,
  * and social edges — used by parser/compiler/evaluator tests.
  *
  * Known facts:
  *  - US entrepreneurs: Bob(2), Carl(4); French entrepreneurs:
  *    Alice(3), Dan(6); French politicians: Eva(9).
  *  - Carl founded OrgB(1); Carl and Dan work for OrgC(7).
  *  - Eva knows Dan; Bob knows Alice; Alice advises Eva.
  */
object SampleGraph {
  val nodes: Seq[GNode] = Seq(
    GNode(1, "OrgB", "org"),
    GNode(2, "Bob", "entrepreneur"),
    GNode(3, "Alice", "entrepreneur"),
    GNode(4, "Carl", "entrepreneur"),
    GNode(6, "Dan", "entrepreneur"),
    GNode(7, "OrgC", "org"),
    GNode(8, "France", "country"),
    GNode(9, "Eva", "politician"),
    GNode(10, "USA", "country"),
    GNode(11, "1998", ""),
  )

  val edges: Seq[GEdge] = Seq(
    GEdge(0, 2, "citizenOf", 10),
    GEdge(1, 4, "citizenOf", 10),
    GEdge(2, 3, "citizenOf", 8),
    GEdge(3, 6, "citizenOf", 8),
    GEdge(4, 9, "citizenOf", 8),
    GEdge(5, 4, "founded", 1),
    GEdge(6, 4, "worksFor", 7),
    GEdge(7, 6, "worksFor", 7),
    GEdge(8, 9, "knows", 6),
    GEdge(9, 2, "knows", 3),
    GEdge(10, 3, "advises", 9),
    GEdge(11, 1, "foundedIn", 11),
  )

  def pg(spark: SparkSession): PropertyGraph =
    PropertyGraph.fromSeqs(spark, nodes, edges)

  def inMemory: InMemoryGraph =
    InMemoryGraph.fromSeqs(nodes.map(_.id), edges)
}
