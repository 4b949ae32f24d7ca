package repro.jobs

import repro.core.{DeepMapping, DmConfig, Encoding, KeyEncoder}
import repro.nn.{MultiTaskNet, NetArch, TaskSpec, Trainer}

/** Diagnostic: per-column memorisation accuracy on customer_demographics
  * under different architectures/training budgets. Used to calibrate the
  * Table II benchmark; not part of the reproduction's results. */
object ProbeCd {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("probe-cd")
    try {
      val df = repro.data.TpcdsLite.customerDemographics(spark, rows = 140_000)
      val cols = Seq("cd_gender", "cd_marital_status", "cd_education_status",
        "cd_purchase_estimate", "cd_credit_rating", "cd_dep_count")
      val dicts = Encoding.buildDicts(df, cols)
      val data = Encoding.toKvData(df, "k" /*placeholder*/ match { case _ => "cd_demo_sk" }, cols, dicts)
      val enc = KeyEncoder(data.keys.max)
      def p(sh: Int, pw: Int) = NetArch(Seq(sh),
        dicts.cols.map(c => TaskSpec(c.name, c.size max 2, Seq(math.min(pw, math.max(12, 2 * c.size))))).toIndexedSeq)
      val configs = Seq(
        ("shared144-pw2c e10 b1024", p(144, 64), Trainer.Config(epochs = 10, batchSize = 1024, lr = 2e-3f)),
        ("shared144-pw2c e14 b1024", p(144, 64), Trainer.Config(epochs = 14, batchSize = 1024, lr = 2e-3f)),
        ("shared192-pw2c e12 b1024", p(192, 64), Trainer.Config(epochs = 12, batchSize = 1024, lr = 2e-3f)),
      )
      configs.foreach { case (name, arch, tc) =>
        val t0 = System.nanoTime()
        val net = MultiTaskNet(enc.featDim, arch, seed = 7)
        Trainer.fit(net, data.keys, data.cols, enc.encode, tc)
        val preds = Trainer.predictAll(net, data.keys, enc.encode)
        val perCol = (0 until data.nCols).map { c =>
          var ok = 0
          var i = 0
          while (i < data.rows) { if (preds(c)(i) == data.cols(c)(i)) ok += 1; i += 1 }
          f"${cols(c).stripPrefix("cd_")}=${ok.toDouble / data.rows}%.3f"
        }
        var exact = 0
        var i = 0
        while (i < data.rows) {
          var all = true
          var c = 0
          while (c < data.nCols && all) { all = preds(c)(i) == data.cols(c)(i); c += 1 }
          if (all) exact += 1
          i += 1
        }
        val secs = (System.nanoTime() - t0) / 1e9
        println(f"[$name] exact=${exact.toDouble / data.rows}%.3f bytes=${net.byteSize} ${perCol.mkString(" ")} (${secs}%.0f s)")
      }
    } finally spark.stop()
  }
}
