package repro.core

import org.scalacheck.Gen

import repro.{PropHelpers, SparkSpec}

/** Key featurisation + dictionaries; Spark dictionary building. */
class EncodingSpec extends SparkSpec with PropHelpers {

  test("KeyEncoder featDim = 10*digits + residue widths") {
    val resid = KeyEncoder(9).mods.sum
    assert(resid == 2 + 3 + 5 + 7 + 8 + 25)
    assert(KeyEncoder(9).featDim == 10 + resid)
    assert(KeyEncoder(99).featDim == 20 + resid)
    assert(KeyEncoder(123456).featDim == 60 + resid)
  }

  test("encode sets exactly digits + residue bits") {
    val enc = KeyEncoder(999)
    forAllN(Gen.choose(0L, 999L), n = 50) { k =>
      val out = new Array[Float](enc.featDim)
      enc.encode(k, out, 0)
      val ones = out.count(_ == 1f)
      assert(ones == enc.digits + enc.mods.length, s"key $k set $ones bits")
      assert(out.forall(v => v == 0f || v == 1f))
    }
  }

  test("encode digit positions are correct") {
    val enc = KeyEncoder(9999)
    val out = new Array[Float](enc.featDim)
    enc.encode(3074L, out, 0)
    assert(out(4) == 1f)        // digit0 = 4
    assert(out(10 + 7) == 1f)   // digit1 = 7
    assert(out(20 + 0) == 1f)   // digit2 = 0
    assert(out(30 + 3) == 1f)   // digit3 = 3
  }

  test("encode residue positions are correct") {
    val enc = KeyEncoder(99)
    val out = new Array[Float](enc.featDim)
    enc.encode(17L, out, 0)
    val base = 20
    assert(out(base + (17 % 2)) == 1f)
    assert(out(base + 2 + (17 % 3)) == 1f)
    assert(out(base + 5 + (17 % 5)) == 1f)
    assert(out(base + 10 + (17 % 7)) == 1f)
    assert(out(base + 17 + (17 % 8)) == 1f)
    assert(out(base + 25 + (17 % 25)) == 1f)
  }

  test("encode honours the offset argument") {
    val enc = KeyEncoder(9)
    val out = new Array[Float](2 * enc.featDim)
    enc.encode(5L, out, enc.featDim)
    assert(out.take(enc.featDim).forall(_ == 0f))
    assert(out(enc.featDim + 5) == 1f)
  }

  test("distinct keys get distinct encodings") {
    val enc = KeyEncoder(9999)
    val seen = scala.collection.mutable.HashSet.empty[Seq[Float]]
    (0L until 500L).foreach { k =>
      val out = new Array[Float](enc.featDim)
      enc.encode(k, out, 0)
      assert(seen.add(out.toSeq), s"collision at $k")
    }
  }

  test("ColumnDict code/decode roundtrip and unknown rejection") {
    val d = ColumnDict("c", Array("A", "B", "C"))
    assert(d.size == 3)
    (0 until 3).foreach(i => assert(d.code(d.decode(i)) == i))
    intercept[IllegalArgumentException](d.code("missing"))
  }

  test("ValueDicts byteSize is positive and reflects content") {
    val small = ValueDicts(Array(ColumnDict("a", Array("x", "y"))))
    val big = ValueDicts(Array(ColumnDict("a", Array.tabulate(5000)(i => s"value-str-$i"))))
    assert(small.byteSize > 0)
    assert(big.byteSize > small.byteSize)
  }

  test("buildDicts collects distinct sorted values via Spark") {
    import spark.implicits._
    val df = Seq((1L, "b"), (2L, "a"), (3L, "b"), (4L, "c")).toDF("k", "v")
    val dicts = Encoding.buildDicts(df, Seq("v"))
    assert(dicts.cols(0).values.toSeq == Seq("a", "b", "c"))
  }

  test("toKvData encodes all rows with dictionary codes") {
    import spark.implicits._
    val df = Seq((10L, "x", "1"), (20L, "y", "2"), (30L, "x", "3")).toDF("k", "a", "b")
    val dicts = Encoding.buildDicts(df, Seq("a", "b"))
    val kv = Encoding.toKvData(df, "k", Seq("a", "b"), dicts)
    assert(kv.rows == 3 && kv.nCols == 2)
    val byKey = kv.keys.zipWithIndex.toMap
    assert(dicts.cols(0).decode(kv.cols(0)(byKey(10L))) == "x")
    assert(dicts.cols(1).decode(kv.cols(1)(byKey(20L))) == "2")
  }

  test("toKvData rejects duplicate keys") {
    import spark.implicits._
    val df = Seq((1L, "a"), (1L, "b")).toDF("k", "v")
    val dicts = Encoding.buildDicts(df, Seq("v"))
    intercept[IllegalArgumentException](Encoding.toKvData(df, "k", Seq("v"), dicts))
  }

  test("integer-typed value columns are encodable (cast to string)") {
    import spark.implicits._
    val df = Seq((1L, 100), (2L, 200)).toDF("k", "v")
    val dicts = Encoding.buildDicts(df, Seq("v"))
    val kv = Encoding.toKvData(df, "k", Seq("v"), dicts)
    assert(dicts.cols(0).decode(kv.cols(0)(0)) == "100" || dicts.cols(0).decode(kv.cols(0)(0)) == "200")
  }
}
