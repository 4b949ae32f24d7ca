package repro.core

import repro.SparkSpec
import repro.compress.BlockCodec
import repro.data.SynthCorr
import repro.nn.Trainer
import repro.store.KvData

/** End-to-end DeepMapping hybrid structure: losslessness (Alg. 1),
  * hallucination rejection, modifications (Alg. 3–5), retrain trigger. */
class DeepMappingSpec extends SparkSpec {

  private def cfg(extra: DmConfig => DmConfig = identity): DmConfig =
    extra(DmConfig(
      codec = BlockCodec.Zstd(3), partitionBytes = 8 * 1024, poolBudget = 1 << 20,
      train = Trainer.Config(epochs = 8, batchSize = 1024)))

  private val highCols = Seq("v1", "v2", "v3", "v4")

  /** Small dataset + fresh build for mutation tests. */
  private lazy val highDf = SynthCorr.multiHigh(spark, rows = 3000)
  private def buildHigh(): DeepMapping =
    DeepMapping.buildFromDf(highDf, "k", highCols, cfg())

  /** Larger dataset + one shared build for read-only tests. */
  private lazy val bigDf = SynthCorr.multiHigh(spark, rows = 20000)
  private lazy val dmShared: DeepMapping = DeepMapping.buildFromDf(bigDf, "k", highCols,
    cfg(c => c.copy(train = Trainer.Config(epochs = 20, batchSize = 1024, lr = 2e-3f))))

  test("lookup returns the exact stored value for every key (lossless)") {
    val dm = dmShared
    val dicts = Encoding.buildDicts(bigDf, highCols)
    val data = Encoding.toKvData(bigDf, "k", highCols, dicts)
    val res = dm.lookup(data.keys)
    data.keys.indices.foreach { i =>
      assert(res(i) != null, s"key ${data.keys(i)} missing")
      (0 until data.nCols).foreach { c =>
        assert(dm.dicts.cols(c).decode(res(i)(c)) == dicts.cols(c).decode(data.cols(c)(i)),
          s"key ${data.keys(i)} col $c")
      }
    }
  }

  test("non-existing keys return NULL — no hallucination") {
    val absent = Array(0L, 20001L, 50_000L, 999_999L)
    assert(dmShared.lookup(absent).forall(_ == null))
  }

  test("lookupValues decodes to original strings") {
    // k=1: v1 = pick((1-1)%2) = "M"; k=2 -> "F"
    assert(dmShared.lookupValues(Array(1L))(0)(0) == "M")
    assert(dmShared.lookupValues(Array(2L))(0)(0) == "F")
  }

  test("model memorises most of the high-correlation data") {
    // singleHigh (period 70) is fully CRT-decodable from the residue
    // features; at 3000 rows the model should capture almost all of it.
    val df = SynthCorr.singleHigh(spark, rows = 3000)
    val dm = DeepMapping.buildFromDf(df, "k", Seq("v"),
      cfg(c => c.copy(train = repro.nn.Trainer.Config(epochs = 60, batchSize = 256, lr = 2e-3f))))
    try {
      val data = Encoding.toKvData(df, "k", Seq("v"), dm.dicts)
      val acc = dm.modelAccuracy(data)
      assert(acc > 0.7, s"high-correlation accuracy only $acc")
    } finally dm.close()
  }

  test("storage breakdown components are all accounted") {
    val s = dmShared.storage
    assert(s.modelBytes > 0 && s.existBytes > 0 && s.decodeBytes > 0)
    assert(s.total == s.modelBytes + s.auxBytes + s.existBytes + s.decodeBytes)
    assert(dmShared.storageBytes == s.total)
  }

  test("high-correlation DM is much smaller than raw data") {
    val data = Encoding.toKvData(bigDf, "k", highCols, dmShared.dicts)
    assert(dmShared.storageBytes < data.rawBytes,
      s"${dmShared.storageBytes} vs raw ${data.rawBytes}")
  }

  test("Alg.3 insert: new keys become visible with correct values") {
    val dm = buildHigh()
    try {
      val insDf = SynthCorr.multiHigh(spark, rows = 200, startKey = 3001)
      val ins = Encoding.toKvData(insDf, "k", highCols, dm.dicts)
      assert(dm.lookup(Array(3100L))(0) == null)
      dm.insert(ins)
      val res = dm.lookup(ins.keys)
      ins.keys.indices.foreach { i =>
        assert(res(i) != null)
        (0 until ins.nCols).foreach(c => assert(res(i)(c) == ins.cols(c)(i)))
      }
    } finally dm.close()
  }

  test("Alg.3 insert: in-distribution inserts mostly avoid T_aux (model generalises)") {
    val dm = buildHigh()
    try {
      val before = dm.aux.entryCount
      val insDf = SynthCorr.multiHigh(spark, rows = 500, startKey = 3001)
      val ins = Encoding.toKvData(insDf, "k", highCols, dm.dicts)
      dm.insert(ins)
      val added = dm.aux.entryCount - before
      assert(added < 500, s"all $added inserts went to aux — model generalised none")
    } finally dm.close()
  }

  test("Alg.4 delete: removed keys return NULL, others unaffected") {
    val dm = buildHigh()
    try {
      dm.delete(Array(10L, 11L, 12L))
      assert(dm.lookup(Array(10L, 11L, 12L)).forall(_ == null))
      assert(dm.lookup(Array(13L))(0) != null)
    } finally dm.close()
  }

  test("Alg.5 update: new values are returned after substitution") {
    val dm = buildHigh()
    try {
      // Update key 1 to the values key 2 would have (wrong for the model).
      val newVals = Array.tabulate(4)(c => dm.lookup(Array(2L))(0)(c))
      dm.update(KvData(Array(1L), newVals.map(v => Array(v))))
      val got = dm.lookup(Array(1L))(0)
      assert(got.sameElements(newVals))
    } finally dm.close()
  }

  test("Alg.5 update of non-existing key is rejected") {
    val dm = buildHigh()
    try {
      intercept[IllegalArgumentException] {
        dm.update(KvData(Array(999_999L), Array.fill(4)(Array(0))))
      }
    } finally dm.close()
  }

  test("Alg.5 update back to model-predicted value drops the aux entry") {
    val dm = buildHigh()
    try {
      val k = 5L
      val modelPred = Trainer.predictAll(dm.model, Array(k), dm.enc.encode).map(_(0))
      // First force a wrong value into aux, then update back to the model's view.
      dm.update(KvData(Array(k), modelPred.map(p => Array((p + 1) % 2))))
      val auxAfterWrong = dm.aux.contains(k)
      assert(auxAfterWrong)
      dm.update(KvData(Array(k), modelPred.map(p => Array(p))))
      assert(!dm.aux.contains(k), "aux entry should be removed when model agrees")
    } finally dm.close()
  }

  test("maybeRetrain fires only above the threshold") {
    val dm = DeepMapping.buildFromDf(highDf, "k", highCols,
      cfg(c => c.copy(retrainThresholdBytes = Long.MaxValue)))
    try {
      val dicts = dm.dicts
      val data = Encoding.toKvData(highDf, "k", highCols, dicts)
      assert(!dm.maybeRetrain(data))
      val dm2Cfg = cfg(c => c.copy(retrainThresholdBytes = 1L))
      val dm2 = DeepMapping.buildFromDf(highDf, "k", highCols, dm2Cfg)
      try assert(dm2.maybeRetrain(data)) finally dm2.close()
    } finally dm.close()
  }

  test("retrain preserves losslessness on current data") {
    val dmU = buildHigh()
    try {
      // Insert cross-distribution data (encodable: shared value domains).
      val insDf = SynthCorr.multiLow(spark, rows = 300, startKey = 3001)
      val ins = Encoding.toKvData(insDf, "k", highCols, dmU.dicts)
      dmU.insert(ins)
      val current = TableModHelper.concat(
        Encoding.toKvData(highDf, "k", highCols, dmU.dicts), ins)
      dmU.retrain(current)
      val res = dmU.lookup(current.keys)
      current.keys.indices.foreach { i =>
        assert(res(i) != null)
        (0 until current.nCols).foreach(c => assert(res(i)(c) == current.cols(c)(i)))
      }
    } finally dmU.close()
  }

  test("DM on low-correlation data still lossless (aux does the work)") {
    val lowDf = SynthCorr.multiLow(spark, rows = 1500)
    val dm = DeepMapping.buildFromDf(lowDf, "k", highCols,
      cfg(c => c.copy(train = Trainer.Config(epochs = 3, batchSize = 1024))))
    try {
      val data = Encoding.toKvData(lowDf, "k", highCols, dm.dicts)
      val res = dm.lookup(data.keys)
      data.keys.indices.foreach { i =>
        assert(res(i) != null)
        (0 until data.nCols).foreach(c => assert(res(i)(c) == data.cols(c)(i)))
      }
    } finally dm.close()
  }

  test("oracle: DM lookup equals DuckDB point-query semantics") {
    import org.apache.spark.sql.functions.col
    val df = SynthCorr.singleHigh(spark, rows = 800)
    val dm = DeepMapping.buildFromDf(df, "k", Seq("v"), cfg())
    try {
      val keys = Array.tabulate(800)(i => i.toLong + 1)
      val vals = dm.lookupValues(keys)
      import spark.implicits._
      val lookupDf = keys.indices.map(i => (keys(i), vals(i)(0))).toDF("k", "v")
      repro.Oracle.assertEquivalent(
        lookupDf.select(col("k").cast("string").as("k"), col("v")),
        "SELECT k, v FROM t ORDER BY 1", "t" -> df)
    } finally dm.close()
  }
}

/** Tiny local helper mirroring bench.TableMod.concat for tests. */
object TableModHelper {
  def concat(a: KvData, b: KvData): KvData =
    KvData(a.keys ++ b.keys, Array.tabulate(a.nCols)(c => a.cols(c) ++ b.cols(c)))
}
