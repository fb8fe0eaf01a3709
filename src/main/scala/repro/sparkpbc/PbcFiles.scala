package repro.sparkpbc

import java.io.{BufferedOutputStream, DataOutputStream, FileOutputStream, RandomAccessFile}
import java.nio.file.{Files, Path, Paths}
import repro.core.PatternDictionary

/** On-disk layout of a `.pbc` file — the container behind the `pbc`
  * DataSourceV2 format.
  *
  * {{{
  *   "PBC1"                      4 B   magic
  *   dictLen                     4 B   big-endian
  *   dict bytes                        serialized PatternDictionary
  *   record payloads                   back-to-back PbcCodec outputs
  *   offsets                 n * 8 B   absolute offset of each record
  *   offsetsStart                8 B
  *   nRecords                    4 B
  *   "PBCE"                      4 B   end magic
  * }}}
  *
  * The trailing fixed-width offset index is what gives *per-record
  * random access*: [[readRecord]] seeks straight to record `i` and
  * decompresses only it — the paper's core advantage over block-wise
  * compression (§7.2.2).
  */
object PbcFiles {
  private val Magic = "PBC1".getBytes("US-ASCII")
  private val EndMagic = "PBCE".getBytes("US-ASCII")

  final class Writer(path: Path, dictBytes: Array[Byte]) {
    private val out = new DataOutputStream(new BufferedOutputStream(new FileOutputStream(path.toFile)))
    private val offsets = scala.collection.mutable.ArrayBuffer.empty[Long]
    private var pos: Long = 0L

    out.write(Magic); pos += 4
    out.writeInt(dictBytes.length); pos += 4
    out.write(dictBytes); pos += dictBytes.length

    def append(record: Array[Byte]): Unit = {
      offsets += pos
      out.write(record)
      pos += record.length
    }

    def close(): Long = {
      val offsetsStart = pos
      offsets.foreach(out.writeLong)
      out.writeLong(offsetsStart)
      out.writeInt(offsets.size)
      out.write(EndMagic)
      out.close()
      offsets.size.toLong
    }
  }

  final case class Loaded(dict: PatternDictionary, records: Vector[Array[Byte]])

  /** Load a whole file (scan path). */
  def readAll(path: Path): Loaded = {
    val bytes = Files.readAllBytes(path)
    require(bytes.length >= 20, s"$path: truncated pbc file")
    val bb = java.nio.ByteBuffer.wrap(bytes)
    val magic = new Array[Byte](4); bb.get(magic)
    require(java.util.Arrays.equals(magic, Magic), s"$path: bad magic")
    val dictLen = bb.getInt
    val dictBytes = new Array[Byte](dictLen); bb.get(dictBytes)
    val dict = PatternDictionary.deserialize(dictBytes)
    val tail = java.nio.ByteBuffer.wrap(bytes, bytes.length - 16, 16)
    val offsetsStart = tail.getLong
    val n = tail.getInt
    val offs = java.nio.ByteBuffer.wrap(bytes, offsetsStart.toInt, n * 8)
    val offsets = Array.fill(n)(offs.getLong)
    val records = (0 until n).map { i =>
      val start = offsets(i).toInt
      val end = if (i + 1 < n) offsets(i + 1).toInt else offsetsStart.toInt
      java.util.Arrays.copyOfRange(bytes, start, end)
    }.toVector
    Loaded(dict, records)
  }

  /** Number of records without loading payloads. */
  def recordCount(path: Path): Int = {
    val raf = new RandomAccessFile(path.toFile, "r")
    try {
      raf.seek(raf.length() - 8)
      raf.readInt()
    } finally raf.close()
  }

  /** Random access: read and return only record `i`'s compressed bytes
    * (three small seeks; neighbouring records are never touched).
    */
  def readRecord(path: Path, i: Int): Array[Byte] = {
    val raf = new RandomAccessFile(path.toFile, "r")
    try {
      val len = raf.length()
      raf.seek(len - 16)
      val offsetsStart = raf.readLong()
      val n = raf.readInt()
      require(i >= 0 && i < n, s"record $i out of range [0,$n)")
      raf.seek(offsetsStart + i.toLong * 8)
      val start = raf.readLong()
      val end = if (i + 1 < n) raf.readLong() else offsetsStart
      raf.seek(start)
      val buf = new Array[Byte]((end - start).toInt)
      raf.readFully(buf)
      buf
    } finally raf.close()
  }

  /** Dictionary bytes of a file (shared by every record in it). */
  def readDict(path: Path): PatternDictionary = {
    val raf = new RandomAccessFile(path.toFile, "r")
    try {
      raf.seek(4)
      val dictLen = raf.readInt()
      val b = new Array[Byte](dictLen)
      raf.readFully(b)
      PatternDictionary.deserialize(b)
    } finally raf.close()
  }

  /** All part files of a dataset directory, deterministically ordered. */
  def listParts(dir: String): Vector[Path] = {
    import scala.jdk.CollectionConverters._
    val d = Paths.get(dir)
    if (!Files.isDirectory(d)) return Vector.empty
    val s = Files.list(d)
    try s.iterator().asScala
      .filter(_.getFileName.toString.endsWith(".pbc")).toVector.sortBy(_.toString)
    finally s.close()
  }
}
