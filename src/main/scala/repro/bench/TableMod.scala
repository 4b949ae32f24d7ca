package repro.bench

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.compress.BlockCodec
import repro.core.{DeepMapping, Encoding}
import repro.data.SynthCorr
import repro.store.{ArrayStore, HashStore, KeyValueStore, KvData}

/** Papers Tables III/IV (insertions following / not following the data
  * distribution) and Table V (deletions) — compressed storage size and
  * query latency after modifying 10 %..60 % of a multi-column synthetic
  * dataset, on the memory-constrained machine.
  *
  * DM-Z materialises modifications in T_aux without retraining (§IV-D);
  * DM-Z1 additionally retrains once when 20 % of the data has been
  * modified (the paper's 200 MB-of-1 GB trigger, scaled). Baselines are
  * rebuilt from the current logical content at every step, matching the
  * paper's measurement of their storage/query at each insertion size.
  */
object TableMod {

  val StepCount = 6
  val B = 20000

  final case class Cell(storageMB: Double, queryMs: Double)
  final case class Step(pct: Int, cells: Map[String, Option[Cell]])
  final case class Result(workload: String, steps: Seq[Step]) {
    def cell(method: String, pct: Int): Cell = steps.find(_.pct == pct).get.cells(method).get
  }

  /** Concatenate two encoded datasets (keys assumed disjoint). */
  def concat(a: KvData, b: KvData): KvData =
    KvData(a.keys ++ b.keys, Array.tabulate(a.nCols)(c => a.cols(c) ++ b.cols(c)))

  /** Remove the given keys. */
  def remove(a: KvData, drop: scala.collection.Set[Long]): KvData = {
    val keep = a.keys.indices.filter(i => !drop.contains(a.keys(i))).toArray
    KvData(keep.map(a.keys), Array.tabulate(a.nCols)(c => keep.map(a.cols(c))))
  }

  private def baselineSet(tag: String, data: KvData, budget: Long): Seq[KeyValueStore] = Seq(
    ArrayStore.build(s"$tag-ab", data, BlockCodec.Noop, Baselines.ArrayPartBytes, budget),
    ArrayStore.build(s"$tag-abcz", data, BlockCodec.Zstd(3), Baselines.ArrayPartBytes, budget),
    HashStore.build(s"$tag-hb", data, BlockCodec.Noop, Baselines.HashPartBytes, budget),
    HashStore.build(s"$tag-hbcz", data, BlockCodec.Zstd(3), Baselines.HashPartBytes, budget),
  )

  /** One modification experiment over one workload.
    * `chunks(i)` is the i-th 10 % modification batch (insert data or
    * delete keys). */
  def runWorkload(workload: String, base: KvData, dicts: repro.core.ValueDicts,
                  insertChunks: Seq[KvData], deleteChunks: Seq[Array[Long]],
                  seed: Long): Result = {
    import TableHarness._
    require(insertChunks.isEmpty != deleteChunks.isEmpty, "exactly one modification kind")
    val isInsert = insertChunks.nonEmpty
    val budget = math.max(1L << 20, (base.rawBytes * 0.35).toLong)

    val dmZ = DeepMapping.build(base, dicts,
      repro.core.DmConfig(codec = BlockCodec.Zstd(3), partitionBytes = 512 * 1024,
        poolBudget = budget, train = dmTrain(base.rows)))
    val dmZ1 = deriveDm(dmZ, BlockCodec.Zstd(3), 512 * 1024, budget)

    var current = base
    val steps = scala.collection.mutable.ArrayBuffer.empty[Step]
    var i = 0
    while (i <= StepCount) {
      if (i > 0) {
        if (isInsert) {
          val chunk = insertChunks(i - 1)
          dmZ.insert(chunk); dmZ1.insert(chunk)
          current = concat(current, chunk)
        } else {
          val chunk = deleteChunks(i - 1)
          dmZ.delete(chunk); dmZ1.delete(chunk)
          current = remove(current, chunk.toSet)
        }
        dmZ.aux.repack(); dmZ1.aux.repack()
        if (i == 2) dmZ1.retrain(current) // scaled 200MB-of-1GB trigger
      }
      val existing = current.keys
      def dmCell(dm: DeepMapping): Cell =
        Cell(mb(dm.storageBytes), lookupLatencyMs(dm, existing, B, seed + i))
      val bl = baselineSet(s"${workload.replaceAll("\\W", "")}$i", current, budget)
      val blCells = bl.map(s => s.name -> Some(Cell(mb(s.storageBytes), lookupLatencyMs(s, existing, B, seed + i))))
      bl.foreach(_.close())
      val cells = Map(
        "DM-Z" -> Some(dmCell(dmZ)),
        "DM-Z1" -> (if (i >= 2) Some(dmCell(dmZ1)) else None),
      ) ++ blCells.toMap
      steps += Step(i * 10, cells)
      i += 1
    }
    dmZ.close(); dmZ1.close()
    Result(workload, steps.toSeq)
  }

  /** Tables III / IV: insertions, in- or cross-distribution. */
  def runInsert(spark: SparkSession, crossDist: Boolean, scale: Double = 1.0, seed: Long = 99): Seq[Result] = {
    val rows = (120_000 * scale).toLong
    val chunk = rows / 10
    def chunks(genLow: Boolean): Seq[DataFrame] = (0 until StepCount).map { i =>
      val start = rows + 1 + i * chunk
      if (genLow) SynthCorr.multiLow(spark, chunk, start, seed = 131 + i)
      else SynthCorr.multiHigh(spark, chunk, start, seed = 131 + i)
    }
    Seq(("Multi-column Low Correlation", true), ("Multi-column High Correlation", false)).map {
      case (name, baseIsLow) =>
        val baseDf = if (baseIsLow) SynthCorr.multiLow(spark, rows) else SynthCorr.multiHigh(spark, rows)
        val insLow = if (crossDist) !baseIsLow else baseIsLow
        val insDfs = chunks(insLow)
        // One dictionary across base + all inserts (shared value domains).
        val union = insDfs.foldLeft(baseDf)(_ union _)
        val valueCols = baseDf.columns.filter(_ != "k").toSeq
        val dicts = Encoding.buildDicts(union, valueCols)
        val base = Encoding.toKvData(baseDf, "k", valueCols, dicts)
        val ins = insDfs.map(df => Encoding.toKvData(df, "k", valueCols, dicts))
        runWorkload(name, base, dicts, ins, Nil, seed)
    }
  }

  /** Table V: deletions of 10 %..60 % of the base data. */
  def runDelete(spark: SparkSession, scale: Double = 1.0, seed: Long = 111): Seq[Result] = {
    val rows = (120_000 * scale).toLong
    Seq(("Multi-column Low Correlation", true), ("Multi-column High Correlation", false)).map {
      case (name, baseIsLow) =>
        val baseDf = if (baseIsLow) SynthCorr.multiLow(spark, rows) else SynthCorr.multiHigh(spark, rows)
        val valueCols = baseDf.columns.filter(_ != "k").toSeq
        val dicts = Encoding.buildDicts(baseDf, valueCols)
        val base = Encoding.toKvData(baseDf, "k", valueCols, dicts)
        // Disjoint random 10% key chunks.
        val rng = new java.util.Random(seed)
        val shuffled = base.keys.clone()
        var i = shuffled.length - 1
        while (i > 0) { val j = rng.nextInt(i + 1); val t = shuffled(i); shuffled(i) = shuffled(j); shuffled(j) = t; i -= 1 }
        val chunk = base.rows / 10
        val deleteChunks = (0 until StepCount).map(c => shuffled.slice(c * chunk, (c + 1) * chunk))
        runWorkload(name, base, dicts, Nil, deleteChunks, seed)
    }
  }

  def render(title: String, results: Seq[Result]): String = {
    val sb = new StringBuilder
    sb.append(s"\n## $title\n")
    results.foreach { r =>
      val pcts = r.steps.map(_.pct)
      sb.append(s"\n### ${r.workload} (modification size as % of base)\n\n")
      sb.append("| Method / Metric | " + pcts.map(p => s"$p%").mkString(" | ") + " |\n")
      sb.append("|---" * (pcts.length + 1) + "|\n")
      val methods = Seq("DM-Z", "DM-Z1", "AB", "ABC-Z", "HB", "HBC-Z")
      methods.foreach { m =>
        val st = r.steps.map(_.cells(m).map(c => TableHarness.fmt(c.storageMB)).getOrElse("-"))
        val qu = r.steps.map(_.cells(m).map(c => TableHarness.fmt(c.queryMs)).getOrElse("-"))
        sb.append(s"| $m-Storage (MB) | " + st.mkString(" | ") + " |\n")
        sb.append(s"| $m-Query (ms) | " + qu.mkString(" | ") + " |\n")
      }
    }
    sb.toString
  }
}
