package repro.baseline

import org.scalatest.funsuite.AnyFunSuite

import repro.store.KvData

/** DeepSqueeze-lite: build, lossy reconstruction, memory-budget failure. */
class DeepSqueezeSpec extends AnyFunSuite {

  private def periodic(n: Int): (KvData, Array[Int]) = {
    val keys = Array.tabulate(n)(i => i.toLong + 1)
    val cols = Array(keys.map(k => ((k - 1) % 3).toInt), keys.map(k => (((k - 1) / 3) % 4).toInt))
    (KvData(keys, cols), Array(3, 4))
  }

  test("build produces a store with positive storage") {
    val (d, cards) = periodic(2000)
    val ds = DeepSqueezeLite.build(d, cards, poolBudget = 1 << 26)
    assert(ds.storageBytes > 0)
    assert(ds.name == "DS")
  }

  test("lookup returns rows for present keys and null for absent") {
    val (d, cards) = periodic(1000)
    val ds = DeepSqueezeLite.build(d, cards, poolBudget = 1 << 26)
    val r = ds.lookup(Array(1L, 500L, 5000L))
    assert(r(0) != null && r(1) != null)
    assert(r(2) == null)
    r(0).foreach(v => assert(v >= 0))
  }

  test("reconstruction is approximately right on structured data (lossy)") {
    val (d, cards) = periodic(3000)
    val ds = DeepSqueezeLite.build(d, cards, poolBudget = 1 << 26)
    val res = ds.lookup(d.keys)
    var exact = 0
    d.keys.indices.foreach { i =>
      if (res(i)(0) == d.cols(0)(i) && res(i)(1) == d.cols(1)(i)) exact += 1
    }
    // Lossy by design: DS cannot guarantee exact categorical recovery
    // (the paper's point). Require only that it beats uniform random
    // guessing (1/12 ≈ 0.083) at the margin — not losslessness.
    assert(exact.toDouble / d.rows > 0.05, s"autoencoder degenerate: $exact/${d.rows}")
    // And every reconstructed code must be in its column's range.
    d.keys.indices.foreach { i =>
      assert(res(i)(0) >= 0 && res(i)(0) < cards(0))
      assert(res(i)(1) >= 0 && res(i)(1) < cards(1))
    }
  }

  test("lookup throws OutOfMemoryBudget when decode set exceeds the pool") {
    val (d, cards) = periodic(50_000)
    val ds = DeepSqueezeLite.build(d, cards, poolBudget = 1024) // tiny pool
    intercept[DeepSqueezeLite.OutOfMemoryBudget](ds.lookup(Array(1L)))
  }

  test("decodeWorkingSetBytes scales with rows") {
    val (d1, cards) = periodic(1000)
    val (d2, _) = periodic(2000)
    val a = DeepSqueezeLite.build(d1, cards, poolBudget = 1 << 26)
    val b = DeepSqueezeLite.build(d2, cards, poolBudget = 1 << 26)
    assert(b.decodeWorkingSetBytes > a.decodeWorkingSetBytes)
  }
}
