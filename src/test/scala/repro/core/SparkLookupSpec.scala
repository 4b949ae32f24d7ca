package repro.core

import org.apache.spark.sql.functions.col

import repro.SparkSpec
import repro.compress.BlockCodec
import repro.data.SynthCorr
import repro.nn.Trainer

/** Distributed lookup paths: snapshot, mapPartitions DataFrame lookup
  * (oracle-checked against DuckDB), UDF registration. */
class SparkLookupSpec extends SparkSpec {

  private val valueCols = Seq("v1", "v2", "v3", "v4")
  private lazy val df = SynthCorr.multiHigh(spark, rows = 2000)
  private lazy val dm = DeepMapping.buildFromDf(df, "k", valueCols,
    DmConfig(codec = BlockCodec.Zstd(3), partitionBytes = 8 * 1024, poolBudget = 1 << 20,
      train = Trainer.Config(epochs = 8, batchSize = 1024)))
  private lazy val snap = dm.snapshot()

  test("snapshot lookupBatch equals direct DeepMapping lookup") {
    val keys = Array(1L, 5L, 77L, 1999L, 123L)
    val direct = dm.lookupValues(keys)
    val viaSnap = snap.lookupBatch(keys)
    keys.indices.foreach { i =>
      assert(direct(i).toSeq == viaSnap(i).toSeq)
    }
  }

  test("snapshot returns null rows for non-existing keys") {
    val r = snap.lookupBatch(Array(0L, 5000L))
    assert(r.forall(_ == null))
  }

  test("lookupDf over all keys matches the source table (oracle-checked)") {
    import spark.implicits._
    val keysDf = (1L to 2000L).toDF("k")
    val out = SparkLookup.lookupDf(spark, snap, keysDf, "k")
    repro.Oracle.assertEquivalent(
      out.select(col("k").cast("string").as("k"), col("v1"), col("v2"), col("v3"), col("v4")),
      "SELECT k, v1, v2, v3, v4 FROM t", "t" -> df)
  }

  test("lookupDf yields nulls for missing keys") {
    import spark.implicits._
    val keysDf = Seq(1L, 999_999L).toDF("k")
    val rows = SparkLookup.lookupDf(spark, snap, keysDf, "k").collect()
    val byKey = rows.map(r => r.getLong(0) -> r).toMap
    assert(byKey(1L).getString(1) != null)
    assert(byKey(999_999L).isNullAt(1))
  }

  test("outputSchema has key + one string column per attribute") {
    val s = SparkLookup.outputSchema("k", snap)
    assert(s.fieldNames.toSeq == Seq("k", "v1", "v2", "v3", "v4"))
  }

  test("registered UDFs answer scalar lookups in SQL") {
    val fns = SparkLookup.registerUdfs(spark, "dm_high", snap)
    assert(fns.length == 4)
    import spark.implicits._
    Seq(1L).toDF("k").createOrReplaceTempView("qk")
    val r = spark.sql(s"SELECT ${fns.head}(k) AS v1 FROM qk").collect()(0).getString(0)
    assert(r == "M") // k=1 -> gender "M"
  }

  test("countMisses is zero for the mapped table (lossless end-to-end)") {
    assert(SparkLookup.countMisses(spark, snap, df, "k", valueCols) == 0L)
  }

  test("countMisses counts corrupted rows") {
    import org.apache.spark.sql.functions.{lit, when}
    val corrupted = df.withColumn("v1",
      when(col("k") <= 10, lit("CORRUPT")).otherwise(col("v1")))
    assert(SparkLookup.countMisses(spark, snap, corrupted, "k", valueCols) == 10L)
  }
}
