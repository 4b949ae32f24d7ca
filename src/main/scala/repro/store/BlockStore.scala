package repro.store

import java.io.RandomAccessFile
import java.nio.file.{Files, Path, Paths}

/** One immutable on-disk file of variable-length blocks with an in-memory
  * offset index — the substrate both baselines and the DeepMapping
  * auxiliary table use for "partitions stored on disk, loaded on demand".
  */
final class BlockStore private (val path: Path, val offsets: Array[Long], val lengths: Array[Int]) {
  def blockCount: Int = offsets.length
  def fileBytes: Long = Files.size(path)

  /** Raw bytes of block `id` (real disk read; the pool caches decoded forms). */
  def read(id: Int): Array[Byte] = {
    val raf = new RandomAccessFile(path.toFile, "r")
    try {
      raf.seek(offsets(id))
      val out = new Array[Byte](lengths(id))
      raf.readFully(out)
      out
    } finally raf.close()
  }

  def delete(): Unit = Files.deleteIfExists(path)
}

object BlockStore {
  private val counter = new java.util.concurrent.atomic.AtomicLong(0)

  def workDir: Path = {
    val p = Paths.get(sys.props.getOrElse("repro.blockdir", sys.props("java.io.tmpdir")), "repro-blocks")
    Files.createDirectories(p)
    p
  }

  /** Write `blocks` sequentially into a fresh file. */
  def write(tag: String, blocks: Seq[Array[Byte]]): BlockStore = {
    val path = workDir.resolve(s"$tag-${counter.incrementAndGet()}.blk")
    val out = Files.newOutputStream(path)
    val offsets = new Array[Long](blocks.size)
    val lengths = new Array[Int](blocks.size)
    var off = 0L
    var i = 0
    blocks.foreach { b =>
      offsets(i) = off; lengths(i) = b.length
      out.write(b)
      off += b.length
      i += 1
    }
    out.close()
    new BlockStore(path, offsets, lengths)
  }
}
