package repro.store

import java.io.{ByteArrayInputStream, ByteArrayOutputStream, ObjectInputStream, ObjectOutputStream}

import repro.compress.BlockCodec

/** Hash-based representation (paper baselines HB / HBC-*): the dataset is
  * split into hash partitions; each partition is a Java-serialized
  * `HashMap[Long, Array[Int]]` (the pickled-dict analogue), optionally
  * block-compressed. Lookup is O(1) inside a partition but loading a
  * partition pays the expensive pointer-rich deserialization the paper
  * identifies as HB's bottleneck.
  */
final class HashStore private (
    val name: String,
    store: BlockStore,
    nBlocks: Int,
    nCols: Int,
    codec: BlockCodec,
    val pool: BufferPool,
) extends KeyValueStore {

  override def storageBytes: Long = store.fileBytes + nBlocks * 8L

  private def blockOf(k: Long): Int = {
    val h = java.lang.Long.hashCode(k)
    math.floorMod(h, nBlocks)
  }

  private def loadBlock(id: Int): java.util.HashMap[Long, Array[Int]] =
    pool.get[java.util.HashMap[Long, Array[Int]]]((store.path, id)) {
      val raw = codec.decompress(store.read(id))
      val in = new ObjectInputStream(new ByteArrayInputStream(raw))
      val m = try in.readObject().asInstanceOf[java.util.HashMap[Long, Array[Int]]] finally in.close()
      // Decoded charge: JVM HashMap entries cost ~48B node + boxed key +
      // value array header — materially larger than the columnar form,
      // which is exactly the paper's observation about hash partitions.
      val charge = m.size.toLong * (48 + 16 + 16 + 4 * nCols) + 64
      (m, charge)
    }

  override def lookup(keys: Array[Long]): Array[Array[Int]] = {
    val out = new Array[Array[Int]](keys.length)
    // Probe in partition order so each partition is deserialized at most
    // once per batch (paper §IV-B.2). The current partition is held in a
    // local so a partition larger than the whole pool budget is still
    // loaded only once per batch, not once per key.
    val order = Array.tabulate(keys.length)(Integer.valueOf)
    java.util.Arrays.sort(order, (a: Integer, b: Integer) =>
      Integer.compare(blockOf(keys(a)), blockOf(keys(b))))
    var cur = -1
    var curMap: java.util.HashMap[Long, Array[Int]] = null
    var oi = 0
    while (oi < order.length) {
      val qi = order(oi).intValue
      val b = blockOf(keys(qi))
      if (b != cur) { curMap = loadBlock(b); cur = b }
      out(qi) = curMap.get(keys(qi)) // null when absent
      oi += 1
    }
    out
  }

  override def close(): Unit = store.delete()
}

object HashStore {
  def build(tag: String, data: KvData, codec: BlockCodec, partitionBytes: Int,
            poolBudget: Long): HashStore = {
    val nBlocks = math.max(1, (data.rawBytes / math.max(1, partitionBytes)).toInt)
    val maps = Array.fill(nBlocks)(new java.util.HashMap[Long, Array[Int]]())
    var i = 0
    while (i < data.rows) {
      val k = data.keys(i)
      val row = new Array[Int](data.nCols)
      var c = 0
      while (c < data.nCols) { row(c) = data.cols(c)(i); c += 1 }
      maps(math.floorMod(java.lang.Long.hashCode(k), nBlocks)).put(k, row)
      i += 1
    }
    val blocks = maps.map { m =>
      val bos = new ByteArrayOutputStream()
      val out = new ObjectOutputStream(bos)
      out.writeObject(m); out.close()
      codec.compress(bos.toByteArray)
    }
    val bs = BlockStore.write(tag, blocks.toSeq)
    val nm = codec match {
      case BlockCodec.Noop => "HB"
      case c               => s"HBC-${c.name.head.toUpper}"
    }
    new HashStore(nm, bs, nBlocks, data.nCols, codec, new BufferPool(poolBudget))
  }
}
