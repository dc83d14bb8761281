package repro.bench

import repro.SparkSpec
import repro.benchlib.CdfBench

/** Fig. 13 reproduction: EQL on CDF graphs, m=2, S_L ∈ {3,6}, vs the
  * path-engine baselines. The paper's shape: reachability checkers are
  * fastest, UNI-MoLESP close behind, path enumerators slower, the
  * undirected enumerator (Neo4j-like) unfeasible beyond tiny sizes,
  * and bidirectional MoLESP the only feasible bidirectional system.
  */
class Fig13CdfM2Bench extends SparkSpec {

  test("Fig 13: CDF benchmark m=2") {
    val grid = Seq(CdfBench.Config(250, 500), CdfBench.Config(1000, 2000), CdfBench.Config(4000, 8000))
    val rows = CdfBench.run(spark, m = 2, sLs = Seq(3, 6), grid = grid,
      neoMaxEdges = 10000L)
    CdfBench.render(2, rows)

    // Every directed system sees exactly the N_L link paths (plus rare
    // parallel-link duplicates) — the CTP/EQL row counts match N_L.
    rows.filter(_.system == "UNI-MoLESP(EQL)").foreach { r =>
      assert(r.rows >= r.nL, s"UNI-MoLESP lost links at nT=${r.nT}")
    }
    rows.filter(_.system == "PgLike(paths,label)").foreach { r =>
      assert(r.rows >= r.nL)
    }
    // Reachability returns pairs (<= path counts).
    rows.filter(_.system == "VirtLike(reach,label)").foreach { r =>
      assert(r.rows <= r.nL)
    }
    // Bidirectional MoLESP completes on every config.
    assert(rows.count(_.system == "MoLESP(EQL)") == grid.size * 2)
  }
}
