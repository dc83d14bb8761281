package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.benchlib.Fig12Qgstp

/** Fig. 12 reproduction: GAM & MoLESP vs QGSTP (DPBF stand-in), UNI +
  * LIMIT 1, grouped by m = 2..6 on the knowledge-graph substitute.
  */
class Fig12QgstpBench extends AnyFunSuite {

  test("Fig 12: UNI LIMIT-1 connection search vs the GSTP baseline") {
    val rows = Fig12Qgstp.run(numNodes = 20000, extraEdges = 50000,
      queriesPerM = 12, timeoutMs = 20000L)
    Fig12Qgstp.render(rows)

    // Every query was constructed to have a unidirectional answer:
    // MoLESP (with §4.9 balanced queues) must find it for every m ≤ 4,
    // and nearly everywhere overall (a few 20s timeouts are tolerated at
    // m ≥ 5 — the paper's GAM also times out at m = 6).
    rows.filter(r => r.algo == "MoLESP" && r.m <= 4).foreach(r =>
      assert(r.found == r.queries, s"MoLESP missed answers at m=${r.m}"))
    val molespRows = rows.filter(_.algo == "MoLESP")
    assert(molespRows.map(_.found).sum >= (molespRows.map(_.queries).sum * 9) / 10,
      "MoLESP should answer at least 90% of all queries")

    // Shape claims: MoLESP beats the single-result GSTP baseline at
    // small m (the frequent cases); the exhaustive-search algorithms
    // degrade as m grows (the paper's GAM times out at m = 6).
    for (m <- 2 to 3) {
      val mo = rows.find(r => r.algo == "MoLESP" && r.m == m).get
      val dp = rows.find(r => r.algo == "QGSTP(DPBF)" && r.m == m).get
      assert(mo.avgMs <= dp.avgMs * 1.5,
        s"MoLESP should be competitive with the GSTP baseline at m=$m")
    }
    val gam2 = rows.find(r => r.algo == "GAM" && r.m == 2).get
    val gam6 = rows.find(r => r.algo == "GAM" && r.m == 6).get
    assert(gam6.timeouts > 0 || gam6.avgMs > 10 * gam2.avgMs,
      "GAM should visibly degrade at m=6 (the paper's timeout)")
  }
}
