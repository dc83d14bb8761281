package repro.bench

import repro.SparkSpec
import repro.benchlib.CdfBench

/** Fig. 14 reproduction: EQL on CDF graphs, m=3, S_L ∈ {3,6}. The path
  * engines must resort to stitching (with its duplicate/non-tree
  * semantics); UNI-MoLESP returns actual connecting trees; bidirectional
  * MoLESP handles the larger search space and still completes.
  */
class Fig14CdfM3Bench extends SparkSpec {

  test("Fig 14: CDF benchmark m=3") {
    val grid = Seq(CdfBench.Config(250, 500), CdfBench.Config(1000, 2000), CdfBench.Config(4000, 8000))
    val rows = CdfBench.run(spark, m = 3, sLs = Seq(3, 6), grid = grid)
    CdfBench.render(3, rows)

    rows.filter(_.system == "UNI-MoLESP(EQL)").foreach { r =>
      assert(r.rows >= r.nL, s"UNI-MoLESP lost links at nT=${r.nT},sL=${r.sL}")
    }
    // Stitching over-produces: it pairs every root-to-bl1 path with
    // every root-to-bl2 path, so its row count is at least the link
    // count, usually far more (§2's semantic mismatch).
    rows.filter(_.system == "PgLike(stitch,label)").foreach { r =>
      assert(r.rows >= r.nL)
    }
    assert(rows.count(_.system == "MoLESP(EQL)") == grid.size * 2)
  }
}
