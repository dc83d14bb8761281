package repro.core

/** Comparison operators Ω = {=, <, ≤, ~} (Def. 2.2); `~` is SQL-LIKE
  * pattern matching with `*` wildcards.
  */
sealed trait Op { def sql: String }
object Op {
  case object Eq extends Op { val sql = "=" }
  case object Lt extends Op { val sql = "<" }
  case object Le extends Op { val sql = "<=" }
  case object Like extends Op { val sql = "LIKE" }
}

/** One condition `p(v) op c` over a variable (Def. 2.2).
  *
  * @param prop "label" (l) or "type" (τ) — the properties our graphs carry
  */
final case class Condition(prop: String, op: Op, value: String) {
  require(prop == "label" || prop == "type", s"unknown property: $prop")
}

/** A predicate over exactly one variable: a conjunction of conditions
  * (possibly empty — then any node/edge matches). `fresh` marks
  * parser-generated variables (constant shorthands) that are dropped
  * from result tables.
  */
final case class Predicate(variable: String, conditions: Seq[Condition], fresh: Boolean = false) {
  def isUnconstrained: Boolean = conditions.isEmpty
}

object Predicate {
  /** The `"Alice"` shorthand: a fresh variable with a label-equality. */
  def labelConst(value: String, freshVar: String): Predicate =
    Predicate(freshVar, Seq(Condition("label", Op.Eq, value)), fresh = true)
}

/** An edge pattern (source, edge, target) of predicates (Def. 2.3). */
final case class EdgePattern(src: Predicate, edge: Predicate, dst: Predicate) {
  def variables: Seq[String] = Seq(src, edge, dst).map(_.variable)
  def userVariables: Seq[String] =
    Seq(src, edge, dst).filterNot(_.fresh).map(_.variable)
}

/** A Basic Graph Pattern: a connected set of edge patterns (Def. 2.4). */
final case class Bgp(patterns: Seq[EdgePattern]) {
  def variables: Seq[String] = patterns.flatMap(_.variables).distinct
  def userVariables: Seq[String] = patterns.flatMap(_.userVariables).distinct
}

/** The CTP filters of §2 (parsed form; pushed down per §4.8). */
final case class CtpFilters(
    uni: Boolean = false,
    labels: Option[Set[String]] = None,
    maxEdges: Option[Int] = None,
    score: Option[String] = None,
    topK: Option[Int] = None,
    timeoutMs: Option[Long] = None,
    limit: Option[Int] = None,
)

/** A Connecting Tree Pattern (Def. 2.5): m member predicates plus the
  * underlined tree variable (written `*w` in the concrete syntax).
  */
final case class Ctp(members: Seq[Predicate], treeVar: String,
                     filters: CtpFilters = CtpFilters()) {
  require(members.size >= 1, "a CTP needs at least one member")
  def memberVariables: Seq[String] = members.map(_.variable)
}

/** A full EQL query (Defs. 2.6/2.11): head variables, BGPs (stored as
  * the connected components of the body's edge patterns), and CTPs.
  */
final case class EqlQuery(head: Seq[String], bgps: Seq[Bgp], ctps: Seq[Ctp]) {
  require(bgps.nonEmpty || ctps.nonEmpty, "empty query body")
  /** All non-fresh, non-tree variables. */
  def simpleUserVariables: Seq[String] =
    (bgps.flatMap(_.userVariables) ++
      ctps.flatMap(_.members.filterNot(_.fresh).map(_.variable))).distinct
}

object EqlQuery {
  /** Partitions edge patterns into connected components (shared
    * variables, fresh ones excluded) — the query's BGPs.
    */
  def componentsOf(patterns: Seq[EdgePattern]): Seq[Bgp] = {
    if (patterns.isEmpty) return Seq.empty
    val n = patterns.size
    val parent = Array.tabulate(n)(identity)
    def find(i: Int): Int = if (parent(i) == i) i else { parent(i) = find(parent(i)); parent(i) }
    def union(a: Int, b: Int): Unit = { val ra = find(a); val rb = find(b); if (ra != rb) parent(ra) = rb }
    val byVar = collection.mutable.HashMap.empty[String, Int]
    patterns.zipWithIndex.foreach { case (p, i) =>
      p.userVariables.foreach { v =>
        byVar.get(v) match {
          case Some(j) => union(i, j)
          case None    => byVar(v) = i
        }
      }
    }
    patterns.indices.groupBy(find).values.toSeq
      .sortBy(_.head)
      .map(is => Bgp(is.map(patterns)))
  }

  /** Builds a query from raw body items, computing BGP components. */
  def of(head: Seq[String], patterns: Seq[EdgePattern], ctps: Seq[Ctp]): EqlQuery =
    EqlQuery(head, componentsOf(patterns), ctps)
}
