package repro.logreducer

import java.nio.charset.StandardCharsets.UTF_8
import scala.collection.mutable
import repro.codecs.LzmaCodec
import repro.core.{ByteReader, ByteWriter}

/** LogReducer-lite (Wei et al., FAST 2021) — parser-based log
  * compression, reimplemented as the Table 5 baseline.
  *
  * Pipeline, matching the original's architecture:
  *  1. parse every line into whitespace tokens; a masked signature
  *    (digit/hex/id tokens replaced by a placeholder) plays the role of
  *    the log parser's template;
  *  2. group lines by signature; tokens constant within a group stay in
  *    the template, the rest become per-position variable columns;
  *  3. encode columns with type-specific encoders — the paper's key
  *    claim: timestamp-like columns delta-encode to epoch offsets,
  *    numeric columns become zigzag-varint deltas, the rest are
  *    length-prefixed strings;
  *  4. the template dictionary, template-id stream and all columns are
  *    compressed with LZMA.
  *
  * Whole-file (not per-record) compression, like the original.
  */
object LogReducer {

  private val backend = new LzmaCodec(6)

  private val numRe  = "[+-]?\\d+".r
  private val hexRe  = "(0x)?[0-9a-fA-F]{6,}".r
  private val tsRe   = "\\d{2,4}[-/.:]\\d{2}[-/.:]\\d{2}.*".r

  private def isVariable(tok: String): Boolean =
    tok.nonEmpty && (
      numRe.matches(tok) || hexRe.matches(tok) || tsRe.matches(tok) ||
        tok.count(_.isDigit) * 2 > tok.length
    )

  private def signature(tokens: Array[String]): String =
    tokens.map(t => if (isVariable(t)) "\u0001" else t).mkString("\u0000")

  /** Columns: 0 = string, 1 = numeric (zigzag delta), 2 = timestamp-free
    * numeric-with-prefix (digits with a constant non-digit template,
    * e.g. `1234ms`) falls back to string.
    */
  def compress(lines: Seq[String]): Array[Byte] = {
    val tokenized = lines.map(_.split(" ", -1)).toVector
    val sigOf = tokenized.map(signature)
    val groups = sigOf.zipWithIndex.groupMap(_._1)(_._2)

    // Stable template ids in first-appearance order.
    val sigOrder = mutable.LinkedHashMap.empty[String, Int]
    sigOf.foreach(s => if (!sigOrder.contains(s)) sigOrder(s) = sigOrder.size)

    // Per template: variable positions = tokens not constant in the group.
    val varPositions = mutable.Map.empty[Int, Array[Int]]
    val templates = mutable.Map.empty[Int, Array[String]]
    sigOrder.foreach { case (sig, tid) =>
      val rows = groups(sig)
      val toks0 = tokenized(rows.head)
      val varying = toks0.indices.filter { p =>
        rows.exists(r => tokenized(r)(p) != toks0(p))
      }.toArray
      varPositions(tid) = varying
      templates(tid) = toks0.zipWithIndex.map { case (t, p) =>
        if (varying.contains(p)) "\u0001" else t
      }
    }

    val out = new ByteWriter(1 << 16)
    // template dictionary
    out.writeVarInt(sigOrder.size.toLong)
    sigOrder.foreach { case (_, tid) =>
      val tpl = templates(tid).mkString("\u0000").getBytes(UTF_8)
      out.writeVarInt(tpl.length.toLong); out.writeBytes(tpl)
      out.writeVarInt(varPositions(tid).length.toLong)
      varPositions(tid).foreach(p => out.writeVarInt(p.toLong))
    }
    // template-id stream
    out.writeVarInt(lines.size.toLong)
    sigOf.foreach(s => out.writeVarInt(sigOrder(s).toLong))
    // variable columns, grouped by (template, position), in line order
    sigOrder.foreach { case (sig, tid) =>
      val rows = groups(sig)
      varPositions(tid).foreach { p =>
        val col = rows.map(r => tokenized(r)(p))
        val numeric = col.forall(v =>
          v.length <= 18 && numRe.matches(v) && v.toLong.toString == v)
        if (numeric) {
          out.writeByte(1)
          var prev = 0L
          col.foreach { v => val x = v.toLong; out.writeZigZag(x - prev); prev = x }
        } else {
          out.writeByte(0)
          col.foreach { v =>
            val b = v.getBytes(UTF_8)
            out.writeVarInt(b.length.toLong); out.writeBytes(b)
          }
        }
      }
    }
    backend.compress(out.toBytes)
  }

  def decompress(blob: Array[Byte]): Vector[String] = {
    val in = new ByteReader(backend.decompress(blob))
    val nTpl = in.readVarInt().toInt
    val templates = Array.ofDim[Array[String]](nTpl)
    val varPositions = Array.ofDim[Array[Int]](nTpl)
    for (t <- 0 until nTpl) {
      val tpl = new String(in.readBytes(in.readVarInt().toInt), UTF_8)
      templates(t) = tpl.split("\u0000", -1)
      varPositions(t) = Array.fill(in.readVarInt().toInt)(in.readVarInt().toInt)
    }
    val nLines = in.readVarInt().toInt
    val tids = Array.fill(nLines)(in.readVarInt().toInt)
    // lines per template, in order of appearance
    val rowsOf = Array.fill(nTpl)(mutable.ArrayBuffer.empty[Int])
    tids.zipWithIndex.foreach { case (t, i) => rowsOf(t) += i }
    val lineToks: Array[Array[String]] = tids.map(t => templates(t).clone())
    for (t <- 0 until nTpl; p <- varPositions(t)) {
      val rows = rowsOf(t)
      val kind = in.readBytes(1)(0)
      if (kind == 1) {
        var prev = 0L
        rows.foreach { r => prev += in.readZigZag(); lineToks(r)(p) = prev.toString }
      } else {
        rows.foreach { r =>
          lineToks(r)(p) = new String(in.readBytes(in.readVarInt().toInt), UTF_8)
        }
      }
    }
    lineToks.map(_.mkString(" ")).toVector
  }
}
