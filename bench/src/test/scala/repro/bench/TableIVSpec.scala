package repro.bench

import repro.SparkSpec

/** Bench for paper Table IV — insertions NOT following the original
  * distribution (cross-distribution: low→high and high→low). */
class TableIVSpec extends SparkSpec {

  private lazy val scale = sys.env.getOrElse("BENCH_SCALE", "1.0").toDouble
  private lazy val results = TableMod.runInsert(spark, crossDist = true, scale)

  test("Table IV: measured table (see bench output)") {
    println(TableMod.render("Table IV — insertions NOT following the original distribution", results))
    assert(results.size == 2)
  }

  test("Table IV: cross-distribution inserts grow high-corr DM faster than in-dist would") {
    // The high-corr base receives random (low-corr) tuples the model
    // cannot generalise to — T_aux must absorb nearly all of them.
    val hi = results.find(_.workload.contains("High")).get
    val growth = hi.cell("DM-Z", 60).storageMB - hi.cell("DM-Z", 0).storageMB
    assert(growth > 0, "aux must grow on out-of-distribution inserts")
  }

  test("Table IV: retraining at 20% reduces DM-Z1 storage vs DM-Z (paper's key claim)") {
    val hi = results.find(_.workload.contains("High")).get
    (30 to 60 by 10).foreach { pct =>
      assert(hi.cell("DM-Z1", pct).storageMB <= hi.cell("DM-Z", pct).storageMB * 1.05,
        s"at $pct%: DM-Z1 ${hi.cell("DM-Z1", pct).storageMB} vs DM-Z ${hi.cell("DM-Z", pct).storageMB}")
    }
  }

  test("Table IV: DM remains smaller than uncompressed baselines throughout") {
    results.foreach { r =>
      (0 to 60 by 10).foreach { pct =>
        assert(r.cell("DM-Z", pct).storageMB < r.cell("AB", pct).storageMB)
      }
    }
  }

  test("Table IV: lookups stay lossless after cross-distribution inserts") {
    // Implicitly covered by TableMod measuring query over current keys —
    // here we just assert latencies are finite/positive.
    results.foreach { r =>
      (0 to 60 by 10).foreach { pct =>
        assert(r.cell("DM-Z", pct).queryMs > 0)
      }
    }
  }
}
