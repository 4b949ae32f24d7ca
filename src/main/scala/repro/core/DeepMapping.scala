package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.compress.BlockCodec
import repro.nn.{Mat, MultiTaskNet, NetArch, TaskSpec, Trainer}
import repro.store.{BufferPool, KeyValueStore, KvData}

/** Build/runtime configuration for a DeepMapping hybrid structure. */
final case class DmConfig(
    codec: BlockCodec = BlockCodec.Zstd(3),
    /** Uncompressed partition size for T_aux (paper tunes 128 KB–8 MB). */
    partitionBytes: Int = 512 * 1024,
    /** Buffer-pool budget for T_aux partitions. */
    poolBudget: Long = 64L * 1024 * 1024,
    train: Trainer.Config = Trainer.Config(),
    /** None -> default heuristic architecture; Some -> e.g. MHAS result. */
    arch: Option[NetArch] = None,
    /** Retrain once T_aux exceeds this many bytes (§IV-D's threshold). */
    retrainThresholdBytes: Long = Long.MaxValue,
    seed: Long = 7L,
)

/** Storage breakdown of the hybrid structure — the Eq. 1 numerator and
  * Fig. 6's bars. */
final case class DmStorage(modelBytes: Long, auxBytes: Long, existBytes: Long, decodeBytes: Long) {
  def total: Long = modelBytes + auxBytes + existBytes + decodeBytes
}

/** The DeepMapping hybrid data representation
  * `M̂ = ⟨M, T_aux, V_exist, f_decode⟩` (paper §IV).
  *
  * Implements Algorithm 1 (batch lookup), Algorithm 3 (insert),
  * Algorithm 4 (delete), Algorithm 5 (update), and the §IV-D lazy
  * retrain trigger. Also a [[KeyValueStore]], so benchmarks drive it
  * through the same interface as the baselines.
  */
final class DeepMapping(
    @volatile var model: MultiTaskNet,
    val enc: KeyEncoder,
    val dicts: ValueDicts,
    @volatile var aux: AuxTable,
    val exist: ExistenceBitmap,
    val cfg: DmConfig,
) extends KeyValueStore {

  override def name: String = s"DM-${cfg.codec.name.head.toUpper}"
  override def pool: BufferPool = aux.pool

  def storage: DmStorage =
    DmStorage(model.byteSize, aux.byteSize, exist.byteSize, dicts.byteSize)

  override def storageBytes: Long = storage.total

  /** Algorithm 1 — (parallel) batch key lookup. Returns per query key the
    * value codes, or null when V_exist says the key does not exist. */
  override def lookup(keys: Array[Long]): Array[Array[Int]] = {
    val n = keys.length
    // Step 3: batch inference over all query keys.
    val preds = Trainer.predictAll(model, keys, enc.encode)
    val out = new Array[Array[Int]](n)
    // Sort probe order so each aux partition is decompressed once per
    // batch (paper §IV-B.2).
    val order = Array.tabulate(n)(Integer.valueOf)
    java.util.Arrays.sort(order, (a: Integer, b: Integer) => java.lang.Long.compare(keys(a), keys(b)))
    var oi = 0
    while (oi < n) {
      val i = order(oi).intValue
      val k = keys(i)
      if (exist.get(k)) { // existence check kills hallucinated results
        val corrected = aux.get(k) // validation against T_aux
        out(i) = if (corrected != null) corrected else Array.tabulate(preds.length)(t => preds(t)(i))
      } // else: NULL (non-existing key)
      oi += 1
    }
    out
  }

  /** Lookup with f_decode applied — original value strings. */
  def lookupValues(keys: Array[Long]): Array[Array[String]] =
    lookup(keys).map { codes =>
      if (codes == null) null
      else Array.tabulate(codes.length)(c => dicts.cols(c).decode(codes(c)))
    }

  /** Algorithm 3 — insert. The model is evaluated on the new tuples; only
    * pairs it cannot generalise to are materialised in T_aux. */
  def insert(data: KvData): Unit = {
    require(data.nCols == dicts.nCols)
    val preds = Trainer.predictAll(model, data.keys, enc.encode)
    var i = 0
    while (i < data.rows) {
      val k = data.keys(i)
      exist.set(k)
      var ok = true
      var c = 0
      while (c < data.nCols && ok) { ok = preds(c)(i) == data.cols(c)(i); c += 1 }
      if (!ok) aux.add(k, Array.tabulate(data.nCols)(c => data.cols(c)(i)))
      i += 1
    }
  }

  /** Algorithm 4 — delete: clear the existence bit, drop any aux entry. */
  def delete(keys: Array[Long]): Unit = {
    var i = 0
    while (i < keys.length) {
      exist.clear(keys(i))
      aux.remove(keys(i))
      i += 1
    }
  }

  /** Algorithm 5 — update (substitution) of existing keys. */
  def update(data: KvData): Unit = {
    require(data.nCols == dicts.nCols)
    val preds = Trainer.predictAll(model, data.keys, enc.encode)
    var i = 0
    while (i < data.rows) {
      val k = data.keys(i)
      require(exist.get(k), s"update of non-existing key $k")
      var ok = true
      var c = 0
      while (c < data.nCols && ok) { ok = preds(c)(i) == data.cols(c)(i); c += 1 }
      if (ok) aux.remove(k) // model now agrees: stale aux entry goes away
      else aux.add(k, Array.tabulate(data.nCols)(c => data.cols(c)(i)))
      i += 1
    }
  }

  /** §IV-D trigger: retrain + reconstruct when T_aux outgrew the
    * threshold. `currentData` is the live logical content of the mapping.
    * Returns true if a retrain happened. */
  def maybeRetrain(currentData: => KvData): Boolean = {
    if (aux.byteSize <= cfg.retrainThresholdBytes) false
    else { retrain(currentData); true }
  }

  /** Unconditional retrain/reconstruct on the given logical content. */
  def retrain(currentData: KvData): Unit = {
    val rebuilt = DeepMapping.build(currentData, dicts, cfg)
    val oldAux = aux
    model = rebuilt.model
    aux = rebuilt.aux
    oldAux.close()
  }

  /** Fraction of live rows the model alone predicts correctly (Fig. 6's
    * "model memorised X% of tuples"). */
  def modelAccuracy(data: KvData): Double = {
    val preds = Trainer.predictAll(model, data.keys, enc.encode)
    var ok = 0
    var i = 0
    while (i < data.rows) {
      var all = true
      var c = 0
      while (c < data.nCols && all) { all = preds(c)(i) == data.cols(c)(i); c += 1 }
      if (all) ok += 1
      i += 1
    }
    ok.toDouble / math.max(1, data.rows)
  }

  /** Immutable, serializable snapshot for executor-side lookup
    * (see [[SparkLookup]]). */
  def snapshot(): DmSnapshot = {
    val (ks, cs) = aux.entries()
    DmSnapshot(model.serialize(), enc, dicts, ks, cs, {
      val keys = scala.collection.mutable.ArrayBuffer.empty[Long]
      var k = 0L
      while (k < exist.capacity) { if (exist.get(k)) keys += k; k += 1 }
      keys.toArray
    })
  }

  override def close(): Unit = aux.close()
}

object DeepMapping {

  /** Default architecture when MHAS is not run: one shared trunk layer
    * scaled to the total output cardinality, one private layer per task
    * scaled to its head cardinality. Kept deliberately compact — the
    * hybrid design (§IV-B) prefers a small imperfect model plus T_aux
    * over a large model chasing the last-mile accuracy. */
  def defaultArch(enc: KeyEncoder, dicts: ValueDicts): NetArch = {
    val sumCards = dicts.cols.map(_.size).sum
    val shared = math.min(160, math.max(64, 3 * sumCards))
    val tasks = dicts.cols.map { c =>
      TaskSpec(c.name, math.max(2, c.size), Seq(math.min(64, math.max(12, 2 * c.size))))
    }
    NetArch(Seq(shared), tasks.toIndexedSeq)
  }

  /** Build the hybrid structure from encoded data (§IV-B):
    * 1. train M on all key→codes pairs;
    * 2. run every key through M; mispredicted pairs go to T_aux;
    * 3. V_exist gets one bit per existing key. */
  def build(data: KvData, dicts: ValueDicts, cfg: DmConfig): DeepMapping = {
    val maxKey = if (data.rows == 0) 0L else data.keys.max
    val enc = KeyEncoder(maxKey)
    val arch = cfg.arch.getOrElse {
      val d = defaultArch(enc, dicts)
      // Clamp head cardinalities to the actual dictionaries.
      d.copy(tasks = d.tasks.zipWithIndex.map { case (t, i) => t.copy(nClasses = math.max(2, dicts.cols(i).size)) })
    }
    val model = MultiTaskNet(enc.featDim, arch, cfg.seed)
    Trainer.fit(model, data.keys, data.cols, enc.encode, cfg.train)
    // Misclassification sweep.
    val preds = Trainer.predictAll(model, data.keys, enc.encode)
    val missKeys = scala.collection.mutable.ArrayBuffer.empty[Long]
    val missCols = Array.fill(data.nCols)(scala.collection.mutable.ArrayBuffer.empty[Int])
    var i = 0
    while (i < data.rows) {
      var ok = true
      var c = 0
      while (c < data.nCols && ok) { ok = preds(c)(i) == data.cols(c)(i); c += 1 }
      if (!ok) {
        missKeys += data.keys(i)
        c = 0
        while (c < data.nCols) { missCols(c) += data.cols(c)(i); c += 1 }
      }
      i += 1
    }
    val aux = AuxTable.build(missKeys.toArray, missCols.map(_.toArray),
      cfg.codec, cfg.partitionBytes, new BufferPool(cfg.poolBudget))
    val exist = ExistenceBitmap.fromKeys(data.keys)
    new DeepMapping(model, enc, dicts, aux, exist, cfg)
  }

  /** DataFrame-first build: dictionaries via Spark aggregations, then the
    * driver-side build above. */
  def buildFromDf(df: DataFrame, keyCol: String, valueCols: Seq[String], cfg: DmConfig): DeepMapping = {
    val dicts = Encoding.buildDicts(df, valueCols)
    val data = Encoding.toKvData(df, keyCol, valueCols, dicts)
    build(data, dicts, cfg)
  }
}

/** Serializable snapshot of a DeepMapping for distributed lookup: model
  * bytes + sorted aux arrays + the existing-key set. Executors rebuild a
  * cheap in-memory view once per partition. */
final case class DmSnapshot(
    modelBytes: Array[Byte],
    enc: KeyEncoder,
    dicts: ValueDicts,
    auxKeys: Array[Long],
    auxCols: Array[Array[Int]],
    existingKeys: Array[Long],
) extends Serializable {

  @transient lazy val model: MultiTaskNet = MultiTaskNet.deserialize(modelBytes)
  @transient lazy val existSet: java.util.HashSet[Long] = {
    val s = new java.util.HashSet[Long](existingKeys.length * 2)
    existingKeys.foreach(s.add)
    s
  }

  /** Algorithm 1 against the snapshot (columnar, batched). */
  def lookupBatch(keys: Array[Long]): Array[Array[String]] = {
    val x = Mat.zeros(keys.length, enc.featDim)
    var r = 0
    while (r < keys.length) { enc.encode(keys(r), x.data, r * enc.featDim); r += 1 }
    val preds = model.predict(x)
    val out = new Array[Array[String]](keys.length)
    r = 0
    while (r < keys.length) {
      val k = keys(r)
      if (existSet.contains(k)) {
        val pos = java.util.Arrays.binarySearch(auxKeys, k)
        val codes =
          if (pos >= 0) Array.tabulate(auxCols.length)(c => auxCols(c)(pos))
          else Array.tabulate(preds.length)(t => preds(t)(r))
        out(r) = Array.tabulate(codes.length)(c => dicts.cols(c).decode(codes(c)))
      }
      r += 1
    }
    out
  }
}
