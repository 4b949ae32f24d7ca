package repro.core.mhas

import repro.nn.{NetArch, TaskSpec}

/** MHAS search space (paper §IV-C.1, scaled per §V-A.6): up to
  * `maxShared` shared hidden layers and `maxPrivate` private hidden
  * layers per task, each layer's width drawn from `sizes`.
  *
  * The controller emits one decision per slot; the decision sequence is
  * fixed-length ([[slots]]) with layer-size decisions ignored when the
  * chosen depth does not reach them — this keeps the LSTM's input
  * sequence static, as in ENAS's macro search space.
  */
final case class SearchSpace(
    taskNames: Seq[String],
    taskCardinalities: Seq[Int],
    sizes: Seq[Int] = Seq(32, 64, 128, 256),
    maxShared: Int = 2,
    maxPrivate: Int = 2,
) {
  require(taskNames.length == taskCardinalities.length)

  /** Decision slots: (label, number of choices). */
  val slots: Seq[(String, Int)] = {
    val shared = ("nShared", maxShared + 1) +:
      (0 until maxShared).map(i => (s"sharedSize$i", sizes.length))
    val perTask = taskNames.flatMap { t =>
      (s"$t.nPriv", maxPrivate + 1) +:
        (0 until maxPrivate).map(i => (s"$t.privSize$i", sizes.length))
    }
    shared ++ perTask
  }

  def slotCount: Int = slots.length

  /** Decode a full decision vector into a concrete architecture. */
  def decode(decisions: Array[Int]): NetArch = {
    require(decisions.length == slotCount)
    var p = 0
    val nShared = decisions(p); p += 1
    val sharedSizes = (0 until maxShared).map { i => val s = sizes(decisions(p + i)); s }.take(nShared)
    p += maxShared
    val tasks = taskNames.zip(taskCardinalities).map { case (name, card) =>
      val nPriv = decisions(p); p += 1
      val privSizes = (0 until maxPrivate).map(i => sizes(decisions(p + i))).take(nPriv)
      p += maxPrivate
      TaskSpec(name, card, privSizes)
    }
    NetArch(sharedSizes, tasks)
  }

  /** Size of the space as reported in the paper's formula discussion —
    * here simply the product of slot cardinalities (an upper bound since
    * unused size slots are don't-cares). */
  def sizeUpperBound: BigInt = slots.map(s => BigInt(s._2)).product
}
