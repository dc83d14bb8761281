package repro.gen

import org.scalatest.funsuite.AnyFunSuite

/** Structural properties of the §5.3 generators: the paper's node/edge
  * count formulas, seed counts, determinism.
  */
class GraphGenSpec extends AnyFunSuite {

  test("line(m, nL) sizes") {
    for (m <- Seq(2, 3, 5, 10); nL <- Seq(0, 1, 3)) {
      val g = GraphGen.line(m, nL)
      assert(g.edges.size == (m - 1) * (nL + 1), s"line($m,$nL) edges")
      assert(g.nodes.size == m + (m - 1) * nL, s"line($m,$nL) nodes")
      assert(g.seedSets.size == m)
      assert(g.seedSets.forall(_.size == 1))
    }
  }

  test("comb(nA, nS, sL, dBA) sizes and m = nA(nS+1)") {
    for (nA <- Seq(1, 2, 3); nS <- Seq(1, 2); sL <- Seq(1, 2); dBA <- Seq(0, 2)) {
      val g = GraphGen.comb(nA, nS, sL, dBA)
      assert(g.seedSets.size == nA * (nS + 1), s"comb($nA,$nS,$sL,$dBA) m")
      val mainEdges = (nA - 1) * (dBA + 1)
      val bristleEdges = nA * nS * sL
      assert(g.edges.size == mainEdges + bristleEdges, s"comb($nA,$nS,$sL,$dBA) edges")
    }
  }

  test("star(m, sL) sizes") {
    for (m <- Seq(2, 4, 6); sL <- Seq(1, 2, 3)) {
      val g = GraphGen.star(m, sL)
      assert(g.edges.size == m * sL)
      assert(g.nodes.size == 1 + m * sL)
      assert(g.seedSets.size == m)
    }
  }

  test("chain(n) has 2n parallel edges and the two end seeds") {
    val g = GraphGen.chain(5)
    assert(g.edges.size == 10)
    assert(g.nodes.size == 6)
    assert(g.seedSets == Seq(Seq(0L), Seq(5L)))
  }

  test("cdf m=2: 12·NT + NL·SL edges, 14·NT + NL·(SL−1) nodes (§5.3)") {
    for (nT <- Seq(1, 4); nL <- Seq(0, 5, 12); sL <- Seq(2, 3, 6)) {
      val (g, info) = GraphGen.cdf(2, nT, nL, sL)
      assert(g.edges.size == 12 * nT + nL * sL, s"cdf(2,$nT,$nL,$sL) edges")
      assert(g.nodes.size == 14 * nT + nL * (sL - 1), s"cdf(2,$nT,$nL,$sL) nodes")
      assert(info.topCLeaves.size == 4 * nT)
      assert(info.eligibleTopLeaves.size == 2 * nT)
      assert(info.bottomGLeaves.size == 2 * nT)
    }
  }

  test("cdf m=3: 12·NT + NL·SL edges; Y-links end at sibling g/h leaves") {
    for (nT <- Seq(2); nL <- Seq(4); sL <- Seq(3, 6)) {
      val (g, info) = GraphGen.cdf(3, nT, nL, sL)
      assert(g.edges.size == 12 * nT + nL * sL, s"cdf(3,$nT,$nL,$sL) edges")
      // Our Y-link uses SL−2 intermediate nodes (the paper's node formula
      // differs slightly; see DESIGN.md).
      assert(g.nodes.size == 14 * nT + nL * (sL - 2))
      assert(info.numLinks == nL)
    }
  }

  test("cdf label alphabet matches the query shapes") {
    val (g, _) = GraphGen.cdf(2, 2, 3, 3)
    val labels = g.edges.map(_.label).toSet
    assert(labels == Set("b", "c", "f", "g", "h", "x"))
  }

  test("cdf is deterministic in its seed") {
    val (g1, _) = GraphGen.cdf(2, 3, 10, 3, seed = 5)
    val (g2, _) = GraphGen.cdf(2, 3, 10, 3, seed = 5)
    val (g3, _) = GraphGen.cdf(2, 3, 10, 3, seed = 6)
    assert(g1.edges == g2.edges)
    assert(g1.edges != g3.edges)
  }

  test("kgraph: weakly connected, deterministic, heterogeneous") {
    val g = GraphGen.kgraph(200, 300, nLabels = 20, seed = 3)
    assert(g.nodes.size == 200)
    assert(g.edges.size >= 199) // backbone + most extra edges (self-targets skipped)
    // Weak connectivity via union-find over endpoints.
    val parent = Array.tabulate(200)(identity)
    def find(x: Int): Int = if (parent(x) == x) x else { parent(x) = find(parent(x)); parent(x) }
    g.edges.foreach(e => parent(find(e.src.toInt)) = find(e.dst.toInt))
    assert((0 until 200).map(find).distinct.size == 1, "kgraph not weakly connected")
    assert(g.edges.map(_.label).distinct.size > 5, "label heterogeneity")
    val g2 = GraphGen.kgraph(200, 300, nLabels = 20, seed = 3)
    assert(g.edges == g2.edges)
  }

  test("line/comb/star edges alternate direction (R3 exercised)") {
    val g = GraphGen.line(4, 2)
    val forward = g.edges.count(e => e.src < e.dst)
    assert(forward > 0 && forward < g.edges.size)
  }

  test("toInMemory round-trips ids and labels") {
    val gen = GraphGen.line(3, 1)
    val m = gen.toInMemory
    assert(m.numNodes == gen.nodes.size)
    assert(m.numEdges == gen.edges.size)
    assert(m.labels.toSeq.contains("r"))
    gen.nodes.foreach(n => assert(m.nodeIndex(n.id) >= 0))
  }
}
