package repro.compress

/** Fixed-width bit packing of non-negative int codes — the reproduction's
  * Dictionary Encoding (ABC-D) payload: values are dictionary codes and
  * each block stores them at ceil(log2(cardinality)) bits.
  */
object BitPack {

  /** Bits needed to represent values in [0, maxValue]. At least 1. */
  def bitsFor(maxValue: Int): Int = {
    require(maxValue >= 0, s"negative maxValue $maxValue")
    math.max(1, 32 - Integer.numberOfLeadingZeros(math.max(1, maxValue)))
  }

  /** Pack `values` at `bits` bits each, little-endian within bytes. */
  def pack(values: Array[Int], bits: Int): Array[Byte] = {
    require(bits >= 1 && bits <= 31, s"bits=$bits out of range")
    val totalBits = values.length.toLong * bits
    val out = new Array[Byte](((totalBits + 7) / 8).toInt)
    var bitPos = 0L
    var i = 0
    while (i < values.length) {
      val v = values(i)
      require(v >= 0 && (bits == 31 || v < (1 << bits)), s"value $v does not fit in $bits bits")
      var b = 0
      while (b < bits) {
        if (((v >>> b) & 1) != 0) {
          val p = bitPos + b
          out((p >>> 3).toInt) = (out((p >>> 3).toInt) | (1 << (p & 7).toInt)).toByte
        }
        b += 1
      }
      bitPos += bits
      i += 1
    }
    out
  }

  /** Inverse of [[pack]]: read `count` values of `bits` bits each. */
  def unpack(bytes: Array[Byte], bits: Int, count: Int): Array[Int] = {
    val out = new Array[Int](count)
    var bitPos = 0L
    var i = 0
    while (i < count) {
      var v = 0
      var b = 0
      while (b < bits) {
        val p = bitPos + b
        if (((bytes((p >>> 3).toInt) >>> (p & 7).toInt) & 1) != 0) v |= (1 << b)
        b += 1
      }
      out(i) = v
      bitPos += bits
      i += 1
    }
    out
  }
}
