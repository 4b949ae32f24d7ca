package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen

import repro.PropHelpers

/** V_exist: set/clear/get semantics, growth, compression accounting. */
class ExistenceBitmapSpec extends AnyFunSuite with PropHelpers {

  test("empty bitmap has no keys") {
    val bm = ExistenceBitmap.empty(100)
    (0L until 100L).foreach(k => assert(!bm.get(k)))
    assert(bm.cardinality == 0)
  }

  test("set then get then clear") {
    val bm = ExistenceBitmap.empty(100)
    bm.set(42)
    assert(bm.get(42))
    assert(!bm.get(41) && !bm.get(43))
    bm.clear(42)
    assert(!bm.get(42))
  }

  test("fromKeys marks exactly the given keys") {
    val keys = Array(1L, 5L, 63L, 64L, 65L, 1000L)
    val bm = ExistenceBitmap.fromKeys(keys)
    keys.foreach(k => assert(bm.get(k)))
    assert(!bm.get(0) && !bm.get(2) && !bm.get(999))
    assert(bm.cardinality == keys.length)
  }

  test("out-of-range get is false, negative keys safe") {
    val bm = ExistenceBitmap.empty(10)
    assert(!bm.get(-1))
    assert(!bm.get(1_000_000))
  }

  test("set grows the bitmap dynamically") {
    val bm = ExistenceBitmap.empty(10)
    bm.set(500)
    assert(bm.get(500))
    assert(bm.capacity >= 501)
    assert(!bm.get(499))
  }

  test("clear beyond capacity is a no-op") {
    val bm = ExistenceBitmap.empty(10)
    bm.clear(1000) // must not throw
    assert(bm.capacity == 10)
  }

  test("cardinality counts across words") {
    forAllN(Gen.containerOf[Set, Long](Gen.choose(0L, 5000L)), n = 20) { keySet =>
      val keys = keySet.toArray
      if (keys.nonEmpty) {
        val bm = ExistenceBitmap.fromKeys(keys)
        assert(bm.cardinality == keys.length)
      }
    }
  }

  test("keysInRange returns exactly the existing keys in the range") {
    val bm = ExistenceBitmap.fromKeys(Array(3L, 7L, 8L, 100L))
    assert(bm.keysInRange(0, 10).toSeq == Seq(3L, 7L, 8L))
    assert(bm.keysInRange(8, 200).toSeq == Seq(8L, 100L))
    assert(bm.keysInRange(9, 99).isEmpty)
  }

  test("byteSize is positive and smaller for sparse bitmaps") {
    val dense = ExistenceBitmap.fromKeys(Array.tabulate(100_000)(i => i.toLong))
    val sparse = ExistenceBitmap.empty(100_000 * 64)
    sparse.set(1)
    assert(dense.byteSize > 0 && sparse.byteSize > 0)
    // A dense contiguous run compresses extremely well too, but the all-
    // zero bitmap of the same word count must compress at least as well.
    assert(sparse.byteSize <= ExistenceBitmap.fromKeys(
      Array.tabulate(100_000)(i => i.toLong * 64)).byteSize)
  }

  test("set is idempotent") {
    val bm = ExistenceBitmap.empty(10)
    bm.set(5); bm.set(5)
    assert(bm.cardinality == 1)
  }

  test("negative set rejected") {
    intercept[IllegalArgumentException](ExistenceBitmap.empty(10).set(-1))
  }
}
