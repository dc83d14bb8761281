package repro.ctp

import repro.core.{GEdge, InMemoryGraph}

/** Helpers for building small in-memory graphs in CTP tests. */
object TestSupport {

  /** Graph from undirected-intent (src,dst) pairs; edge ids 0,1,2,…
    * (edges stored directed as given; traversal is bidirectional).
    */
  def graph(edges: (Long, Long)*): InMemoryGraph =
    labeledGraph(edges.map { case (a, b) => (a, "r", b) }: _*)

  /** Graph from (src, label, dst) triples; edge ids 0,1,2,… */
  def labeledGraph(edges: (Long, String, Long)*): InMemoryGraph = {
    val es = edges.zipWithIndex.map { case ((a, l, b), i) => GEdge(i.toLong, a, l, b) }
    val ns = es.flatMap(e => Seq(e.src, e.dst)).distinct
    InMemoryGraph.fromSeqs(ns, es)
  }

  def seeds(sets: Seq[Long]*): Seq[SeedSpec] = sets.map(NodeSeeds(_))

  /** All GAM-family variants, paired with runnable closures. */
  def gamAll(g: InMemoryGraph, ss: Seq[SeedSpec], cfg: CtpEvalConfig): Map[String, SearchOutcome] =
    GamVariant.all.map(v => v.name -> GamEngine.run(g, ss, cfg, v)).toMap

  /** Result keys from the brute-force oracle. */
  def bruteKeys(g: InMemoryGraph, ss: Seq[SeedSpec],
                cfg: CtpEvalConfig = CtpEvalConfig()): Set[String] =
    BruteForce.run(g, ss, cfg).resultKeys
}
