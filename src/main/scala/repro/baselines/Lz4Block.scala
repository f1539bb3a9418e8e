package repro.baselines

import io.airlift.compress.lz4.{Lz4Compressor, Lz4Decompressor}
import java.io.{ByteArrayOutputStream, DataOutputStream}
import java.nio.ByteBuffer

/** Block-wise LZ4 framing used by the Cassandra-like baseline: the payload is
  * cut into fixed-size chunks (Cassandra's default chunk length is 64 KiB),
  * each compressed independently and prefixed with its compressed and raw
  * lengths.
  */
object Lz4Block {

  val DefaultChunk: Int = 64 * 1024

  /** Compress `raw` into the framed block format. */
  def compress(raw: Array[Byte], chunk: Int = DefaultChunk): Array[Byte] = {
    val compressor = new Lz4Compressor
    val out        = new ByteArrayOutputStream(raw.length / 2 + 64)
    val dos        = new DataOutputStream(out)
    dos.writeInt(raw.length)
    var off = 0
    while (off < raw.length) {
      val len   = math.min(chunk, raw.length - off)
      val bound = compressor.maxCompressedLength(len)
      val buf   = new Array[Byte](bound)
      val clen  = compressor.compress(raw, off, len, buf, 0, bound)
      dos.writeInt(clen)
      dos.writeInt(len)
      dos.write(buf, 0, clen)
      off += len
    }
    dos.flush()
    out.toByteArray
  }

  /** Decompress a framed block back to the raw payload. */
  def decompress(framed: Array[Byte]): Array[Byte] = {
    val bb    = ByteBuffer.wrap(framed)
    val total = bb.getInt
    val out   = new Array[Byte](total)
    val d     = new Lz4Decompressor
    var off   = 0
    while (off < total) {
      val clen = bb.getInt
      val rlen = bb.getInt
      val cbuf = new Array[Byte](clen)
      bb.get(cbuf)
      val n = d.decompress(cbuf, 0, clen, out, off, rlen)
      require(n == rlen, s"LZ4 chunk decompressed to $n bytes, expected $rlen")
      off += rlen
    }
    out
  }
}
