package repro.core

import java.nio.charset.StandardCharsets.UTF_8
import repro.fsst.FsstTable

/** Pattern-Based Compression codec (paper Fig. 1b/1c).
  *
  * Compresses every record individually: the record is matched against
  * the dictionary patterns longest-first; the winning pattern's ID and
  * its encoded residual fields form the compressed record. Records that
  * match no pattern (or violate a pattern's field encoders) are stored
  * raw as outliers.
  *
  * Wire format per record (record boundaries are kept by the container):
  * {{{
  *   varint header          // 0 = outlier, else patternId + 1
  *   outlier: payload bytes // raw UTF-8, or FSST-coded in PBC_F mode
  *   match:   field_0 ... field_{n-1} per the pattern's encoders;
  *            VARCHAR payloads are FSST-coded in PBC_F mode
  * }}}
  *
  * `useFsst = true` (with a dictionary carrying an FSST table) is the
  * paper's `PBC_F` variant — still strictly per-record, so random access
  * is preserved. `PBC_Z`/`PBC_L` are block-level compositions built on
  * top of [[Framing]] plus a block codec.
  */
final class PbcCodec(val dict: PatternDictionary, val useFsst: Boolean = false)
    extends Serializable {

  private val fsst: Option[FsstTable] = if (useFsst) dict.fsst else None
  require(!useFsst || fsst.isDefined, "PBC_F requires a dictionary with an FSST table")

  /** Outlier count since construction (drives the paper's re-training
    * trigger in the production integration).
    */
  @transient private var outlierCount0: Long = 0L
  @transient private var recordCount0: Long = 0L
  def outlierCount: Long = outlierCount0
  def recordCount: Long = recordCount0
  def outlierRate: Double = if (recordCount0 == 0) 0.0 else outlierCount0.toDouble / recordCount0

  /** String payload framing.
    *
    * Plain mode: `varint(len) ++ bytes` (VARCHAR) or bare bytes (outlier;
    * the container keeps boundaries). PBC_F mode stores whichever of
    * {raw, FSST-coded} is smaller, flagged in the low bit of the length
    * varint (VARCHAR) or a leading flag varint (outlier) — FSST must
    * never make a record larger than plain PBC.
    */
  private def writeString(out: ByteWriter, b: Array[Byte], lengthPrefixed: Boolean): Unit =
    fsst match {
      case Some(t) =>
        val coded = t.encode(b)
        val (payload, flag) = if (coded.length < b.length) (coded, 1L) else (b, 0L)
        if (lengthPrefixed) out.writeVarInt((payload.length.toLong << 1) | flag)
        else out.writeVarInt(flag)
        out.writeBytes(payload)
      case None =>
        if (lengthPrefixed) out.writeVarInt(b.length.toLong)
        out.writeBytes(b)
    }

  private def readString(in: ByteReader, lengthPrefixed: Boolean): String =
    fsst match {
      case Some(t) =>
        val (payload, coded) =
          if (lengthPrefixed) {
            val header = in.readVarInt()
            (in.readBytes((header >>> 1).toInt), (header & 1L) == 1L)
          } else {
            val flag = in.readVarInt()
            (in.readRest(), flag == 1L)
          }
        new String(if (coded) t.decode(payload) else payload, UTF_8)
      case None =>
        val raw =
          if (lengthPrefixed) in.readBytes(in.readVarInt().toInt)
          else in.readRest()
        new String(raw, UTF_8)
    }

  def compress(record: String): Array[Byte] = {
    recordCount0 += 1
    val out = new ByteWriter(record.length / 2 + 8)
    var id = 0
    val n = dict.patterns.length
    while (id < n) {
      val cp = dict.patterns(id)
      if (cp.pattern.litLen <= record.length) {
        cp.pattern.matchRecord(record) match {
          case Some(caps) =>
            var ok = true
            var f = 0
            while (ok && f < caps.length) { ok = cp.encoders(f).accepts(caps(f)); f += 1 }
            if (ok) {
              out.writeVarInt(id.toLong + 1L)
              f = 0
              while (f < caps.length) {
                cp.encoders(f) match {
                  case FieldEncoder.VarChar =>
                    writeString(out, caps(f).getBytes(UTF_8), lengthPrefixed = true)
                  // PBC_F also re-encodes CHAR fields long enough for FSST
                  // to win (the paper applies the residual encoder to all
                  // string residuals); short CHARs stay raw — a length
                  // header would cost more than FSST could save
                  case FieldEncoder.Char_(n) if fsst.isDefined && n >= 4 =>
                    writeString(out, caps(f).getBytes(UTF_8), lengthPrefixed = true)
                  case e => e.encode(caps(f), out)
                }
                f += 1
              }
              return out.toBytes
            }
          case None => ()
        }
      }
      id += 1
    }
    // outlier
    outlierCount0 += 1
    out.writeVarInt(0L)
    writeString(out, record.getBytes(UTF_8), lengthPrefixed = false)
    out.toBytes
  }

  def decompress(bytes: Array[Byte]): String = {
    val in = new ByteReader(bytes)
    val h = in.readVarInt()
    if (h == 0L) readString(in, lengthPrefixed = false)
    else {
      val cp = dict.patterns((h - 1).toInt)
      cp.pattern.renderWith(cp.encoders.length, f =>
        cp.encoders(f) match {
          case FieldEncoder.VarChar => readString(in, lengthPrefixed = true)
          case FieldEncoder.Char_(n) if fsst.isDefined && n >= 4 =>
            readString(in, lengthPrefixed = true)
          case e => e.decode(in)
        })
    }
  }
}

/** Length-prefixed record framing for block-level composition
  * (`PBC_Z` / `PBC_L`): per-record byte arrays → one blob and back.
  */
object Framing {
  def pack(records: Iterator[Array[Byte]]): Array[Byte] = {
    val out = new ByteWriter(4096)
    records.foreach { r => out.writeVarInt(r.length.toLong); out.writeBytes(r) }
    out.toBytes
  }

  def unpack(blob: Array[Byte]): Vector[Array[Byte]] = {
    val in = new ByteReader(blob)
    val out = Vector.newBuilder[Array[Byte]]
    while (in.hasRemaining) out += in.readBytes(in.readVarInt().toInt)
    out.result()
  }
}
