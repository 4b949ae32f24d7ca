package repro.compress

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen

import repro.PropHelpers

/** Bit packing (dictionary-encoding payload): round-trips + size math. */
class BitPackSpec extends AnyFunSuite with PropHelpers {

  test("bitsFor exact powers and boundaries") {
    assert(BitPack.bitsFor(0) == 1)
    assert(BitPack.bitsFor(1) == 1)
    assert(BitPack.bitsFor(2) == 2)
    assert(BitPack.bitsFor(3) == 2)
    assert(BitPack.bitsFor(4) == 3)
    assert(BitPack.bitsFor(255) == 8)
    assert(BitPack.bitsFor(256) == 9)
    assert(BitPack.bitsFor(Int.MaxValue) == 31)
  }

  test("bitsFor rejects negative") {
    intercept[IllegalArgumentException](BitPack.bitsFor(-1))
  }

  test("roundtrip on random arrays at random widths") {
    val gen = for {
      bits <- Gen.choose(1, 20)
      n <- Gen.choose(0, 500)
      vals <- Gen.containerOfN[Array, Int](n, Gen.choose(0, (1 << bits) - 1))
    } yield (bits, vals)
    forAllN(gen, n = 40) { case (bits, vals) =>
      assert(BitPack.unpack(BitPack.pack(vals, bits), bits, vals.length).sameElements(vals))
    }
  }

  test("packed size is ceil(n*bits/8) bytes") {
    val vals = Array.fill(100)(5)
    assert(BitPack.pack(vals, 3).length == math.ceil(100 * 3 / 8.0).toInt)
    assert(BitPack.pack(vals, 7).length == math.ceil(100 * 7 / 8.0).toInt)
  }

  test("pack rejects values that do not fit") {
    intercept[IllegalArgumentException](BitPack.pack(Array(8), 3))
    intercept[IllegalArgumentException](BitPack.pack(Array(-1), 3))
  }

  test("empty array round-trips") {
    assert(BitPack.unpack(BitPack.pack(Array.empty[Int], 5), 5, 0).isEmpty)
  }

  test("single max value at each width") {
    (1 to 24).foreach { bits =>
      val v = (1 << bits) - 1
      assert(BitPack.unpack(BitPack.pack(Array(v), bits), bits, 1)(0) == v)
    }
  }

  test("dictionary-style payload shrinks vs 4-byte ints") {
    val vals = Array.tabulate(10_000)(i => i % 7) // 3 bits each
    val packed = BitPack.pack(vals, BitPack.bitsFor(6))
    assert(packed.length < vals.length * 4 / 8)
  }
}
