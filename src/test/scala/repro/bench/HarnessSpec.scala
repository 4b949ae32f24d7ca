package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.store.KvData

/** Benchmark harness helpers: data merging, key sampling, rendering. */
class HarnessSpec extends AnyFunSuite {

  private def kv(keys: Long*): KvData =
    KvData(keys.toArray, Array(keys.map(k => (k % 5).toInt).toArray))

  test("TableMod.concat merges keys and columns") {
    val c = TableMod.concat(kv(1, 2), kv(10, 11, 12))
    assert(c.rows == 5)
    assert(c.keys.toSeq == Seq(1L, 2L, 10L, 11L, 12L))
    assert(c.cols(0).toSeq == Seq(1, 2, 0, 1, 2))
  }

  test("TableMod.remove drops exactly the requested keys") {
    val r = TableMod.remove(kv(1, 2, 3, 4), Set(2L, 4L))
    assert(r.keys.toSeq == Seq(1L, 3L))
    assert(r.cols(0).toSeq == Seq(1, 3))
  }

  test("TableMod.remove with empty set is identity") {
    val d = kv(5, 6)
    val r = TableMod.remove(d, Set.empty[Long])
    assert(r.keys.sameElements(d.keys))
  }

  test("randomKeys samples only existing keys, deterministically") {
    val existing = Array(10L, 20L, 30L)
    val a = TableHarness.randomKeys(existing, 100, seed = 5)
    val b = TableHarness.randomKeys(existing, 100, seed = 5)
    assert(a.sameElements(b))
    assert(a.forall(existing.contains))
    assert(a.length == 100)
  }

  test("fmt formats by magnitude") {
    assert(TableHarness.fmt(123.456) == "123")
    assert(TableHarness.fmt(12.34) == "12.3")
    assert(TableHarness.fmt(1.234) == "1.23")
  }

  test("mb converts bytes") {
    assert(TableHarness.mb(2_000_000L) == 2.0)
  }

  test("renderTable emits a markdown table with all cells") {
    val s = TableHarness.renderTable("T", Seq("A", "B"),
      Seq(("m1", Seq("1", "2")), ("m2", Seq("3", "4"))))
    assert(s.contains("### T"))
    assert(s.contains("| Metric | A | B |"))
    assert(s.contains("| m1 | 1 | 2 |"))
    assert(s.contains("| m2 | 3 | 4 |"))
  }

  test("timeMs measures and returns the value") {
    val (v, ms) = TableHarness.timeMs { Thread.sleep(10); 42 }
    assert(v == 42)
    assert(ms >= 9)
  }

  test("dmTrain scales epochs down as rows grow") {
    assert(TableHarness.dmTrain(10_000).epochs > TableHarness.dmTrain(1_000_000).epochs)
  }

  test("lookupLatencyMs averages over reps and actually runs lookups") {
    var calls = 0
    val store = new repro.store.KeyValueStore {
      val name = "stub"
      val storageBytes = 0L
      val pool = new repro.store.BufferPool(0)
      def lookup(keys: Array[Long]): Array[Array[Int]] = { calls += 1; keys.map(_ => Array(0)) }
    }
    val ms = TableHarness.lookupLatencyMs(store, Array(1L, 2L), b = 5, seed = 1)
    assert(calls == TableHarness.Reps)
    assert(ms >= 0)
  }
}
