package repro.core.mhas

import repro.core.{KeyEncoder, ValueDicts}
import repro.nn.{Dense, Mat, MultiTaskNet, NetArch, Trainer}
import repro.store.KvData

/** Multi-task hybrid architecture search — paper Algorithm 2.
  *
  * Alternates (a) *model training iterations* — train the currently
  * sampled child for a few mini-batches with weights drawn from a shared
  * bank, so layers sampled again later keep their learned parameters
  * (ENAS weight sharing) — and (b) *controller training iterations* —
  * REINFORCE updates of the LSTM controller against the Eq. 1 objective
  *
  *   (size(M) + size(T_aux) + size(V_exist) + size(f_decode)) / size(D)
  *
  * where size(T_aux) is estimated from the child's current error rate on
  * an evaluation sample times the compressed bytes-per-misclassified-row.
  */
object Mhas {

  final case class Config(
      space: SearchSpace,
      /** Total search iterations N_t (paper: 2000; scaled down here). */
      iterations: Int = 60,
      /** Mini-batches of model training per model iteration. */
      trainBatchesPerIter: Int = 8,
      /** Controller updates happen every `controllerEvery` iterations
        * (paper: every 50, 1 epoch of controller training). */
      controllerEvery: Int = 5,
      batchSize: Int = 2048,
      modelLr: Float = 1e-3f,
      controllerLr: Float = 3.5e-4f, // paper §V-A.6
      /** Rows used for the reward estimate. */
      evalRows: Int = 4096,
      /** Estimated codec ratio for aux rows (zstd on sorted pairs). */
      auxCodecRatio: Double = 0.55,
      seed: Long = 21L,
  )

  final case class Result(arch: NetArch, bestRatio: Double, ratioHistory: Seq[Double]) {
    /** Fig. 9's qualitative property: the best ratio found late in the
      * search is at least as good as anything sampled early. A short,
      * noisy search cannot guarantee monotone *means* (the paper smooths
      * over a 500-sample window), so we compare running minima. */
    def historyImproved: Boolean = {
      if (ratioHistory.length < 4) true
      else {
        val half = ratioHistory.length / 2
        val earlyBest = ratioHistory.take(half).min
        val lateBest = ratioHistory.drop(half).min
        lateBest <= earlyBest * 1.05 + 1e-9
      }
    }
  }

  /** Shared-weight bank: one Dense per (slot-id, in, out, relu) reused by
    * every sampled child that selects that slot shape. */
  private final class Bank(seed: Long) {
    private val m = scala.collection.mutable.HashMap.empty[(String, Int, Int, Boolean), Dense]
    def layer(slot: String, in: Int, out: Int, relu: Boolean): Dense =
      m.getOrElseUpdate((slot, in, out, relu), new Dense(in, out, relu, seed + m.size))
  }

  private def childFromBank(bank: Bank, featDim: Int, arch: NetArch): MultiTaskNet = {
    var prev = featDim
    val shared = arch.sharedSizes.zipWithIndex.map { case (sz, i) =>
      val l = bank.layer(s"shared$i", prev, sz, relu = true); prev = sz; l
    }.toArray
    val sharedOut = prev
    val priv = arch.tasks.map { t =>
      var p = sharedOut
      val hidden = t.privateSizes.zipWithIndex.map { case (sz, i) =>
        val l = bank.layer(s"${t.name}.p$i", p, sz, relu = true); p = sz; l
      }
      (hidden :+ bank.layer(s"${t.name}.head", p, t.nClasses, relu = false)).toArray
    }.toArray
    new MultiTaskNet(featDim, arch, shared, priv)
  }

  /** Eq. 1 estimate for a trained child on an eval sample. */
  private def ratioEstimate(net: MultiTaskNet, data: KvData, enc: KeyEncoder, dicts: ValueDicts,
                            evalIdx: Array[Int], cfg: Config): Double = {
    val n = evalIdx.length
    val x = Mat.zeros(n, enc.featDim)
    var r = 0
    while (r < n) { enc.encode(data.keys(evalIdx(r)), x.data, r * enc.featDim); r += 1 }
    val preds = net.predict(x)
    var miss = 0
    r = 0
    while (r < n) {
      var ok = true
      var c = 0
      while (c < data.nCols && ok) { ok = preds(c)(r) == data.cols(c)(evalIdx(r)); c += 1 }
      if (!ok) miss += 1
      r += 1
    }
    val missRate = miss.toDouble / n
    val auxBytes = missRate * data.rows * data.rawRowBytes * cfg.auxCodecRatio
    val existBytes = data.rows / 8.0 * 0.25 // compressed bit vector estimate
    (net.byteSize + auxBytes + existBytes + dicts.byteSize) / data.rawBytes.toDouble
  }

  /** Run the search; returns the best architecture by estimated Eq. 1. */
  def search(data: KvData, dicts: ValueDicts, cfg: Config): Result = {
    val maxKey = if (data.rows == 0) 0L else data.keys.max
    val enc = KeyEncoder(maxKey)
    val rng = new java.util.Random(cfg.seed)
    val bank = new Bank(cfg.seed)
    val controller = new Controller(cfg.space, seed = cfg.seed)
    val evalIdx = Array.fill(math.min(cfg.evalRows, data.rows))(rng.nextInt(data.rows))
    val order = Array.tabulate(data.rows)(identity)

    var baseline = -1.0 // EMA of rewards
    var bestRatio = Double.MaxValue
    var bestArch: NetArch = cfg.space.decode(new Array[Int](cfg.space.slotCount))
    val history = scala.collection.mutable.ArrayBuffer.empty[Double]
    var adamT = 0

    var iter = 0
    while (iter < cfg.iterations) {
      // --- model training iteration (controller fixed) ---
      val s = controller.sample(rng)
      val arch = cfg.space.decode(s.decisions)
      val child = childFromBank(bank, enc.featDim, arch)
      var b = 0
      while (b < cfg.trainBatchesPerIter) {
        val from = rng.nextInt(math.max(1, data.rows - cfg.batchSize + 1))
        val until = math.min(data.rows, from + cfg.batchSize)
        val x = Trainer.encodeBatch(data.keys, order, from, until, enc.featDim, enc.encode)
        val y = data.cols.map(col => java.util.Arrays.copyOfRange(col, from, until))
        adamT += 1
        child.trainBatch(x, y, cfg.modelLr, adamT)
        b += 1
      }
      // --- controller training iteration (weights fixed) ---
      if ((iter + 1) % cfg.controllerEvery == 0) {
        val s2 = controller.sample(rng)
        val arch2 = cfg.space.decode(s2.decisions)
        val child2 = childFromBank(bank, enc.featDim, arch2)
        val ratio = ratioEstimate(child2, data, enc, dicts, evalIdx, cfg)
        history += ratio
        if (ratio < bestRatio) { bestRatio = ratio; bestArch = arch2 }
        val reward = -ratio
        baseline = if (baseline == -1.0) reward else 0.9 * baseline + 0.1 * reward
        controller.reinforce(s2, reward - baseline, cfg.controllerLr)
      }
      iter += 1
    }
    // Final greedy sample is also a candidate.
    val greedy = controller.sample(rng, greedy = true)
    val gArch = cfg.space.decode(greedy.decisions)
    val gChild = childFromBank(bank, enc.featDim, gArch)
    val gRatio = ratioEstimate(gChild, data, enc, dicts, evalIdx, cfg)
    if (gRatio < bestRatio) { bestRatio = gRatio; bestArch = gArch }
    Result(bestArch, bestRatio, history.toSeq)
  }
}
