package repro.tables

import java.nio.charset.StandardCharsets.UTF_8
import scala.collection.concurrent.TrieMap
import repro.codecs.DictTraining
import repro.core.{PatternDictionary, PatternExtractor}
import repro.data.MachineData
import repro.fsst.{Fsst, FsstTable}

/** Per-dataset offline training artifacts, cached across table runners
  * (the paper trains once per workload and reuses the dictionary until
  * the data-generation program changes — §7.5).
  */
object Dictionaries {

  /** Per-dataset extraction configs: k (pattern budget), sample size and
    * the pattern-length cap scale with record length so the O(S²·n·m)
    * clustering stays tractable on long-record datasets.
    */
  def pbcConfig(name: String): PatternExtractor.Config = name match {
    // unece records are ~6 KB: the pattern must cover the whole record
    // (a truncating cap degrades the tail to residual), so the sample is
    // kept tiny to bound the O(S²·n·m) clustering
    case "unece"  => PatternExtractor.Config(k = 4, sampleSize = 12, maxPatternLen = 7000)
    case "github" => PatternExtractor.Config(k = 12, sampleSize = 60, maxPatternLen = 1200)
    case "Hadoop" | "AliLogs" =>
      PatternExtractor.Config(k = 24, sampleSize = 100, maxPatternLen = 500)
    case _ => PatternExtractor.Config(k = 16, sampleSize = 120, maxPatternLen = 320)
  }

  private val records0 = TrieMap.empty[String, Vector[String]]
  private val pbcDicts = TrieMap.empty[String, PatternDictionary]
  private val zstdDicts = TrieMap.empty[String, Array[Byte]]
  private val fsstTables = TrieMap.empty[String, FsstTable]

  /** Benchmark-scale corpus for a dataset (cached). */
  def records(name: String): Vector[String] =
    records0.getOrElseUpdate(name, MachineData.records(name, MachineData.benchCounts(name)))

  def rawBytes(name: String): Long = records(name).map(_.getBytes(UTF_8).length.toLong).sum

  /** PBC dictionary (optionally with the FSST table for PBC_F).
    * Clustering does not depend on the FSST flag, so each dataset is
    * trained once with the table attached and the plain variant is
    * derived by stripping it.
    */
  def pbc(name: String, withFsst: Boolean): PatternDictionary = {
    val full = pbcDicts.getOrElseUpdate(name, {
      PatternExtractor.train(records(name), pbcConfig(name).copy(withFsst = true))
    })
    if (withFsst) full else full.copy(fsst = None)
  }

  /** Zstd-trained dictionary over a sample (shared by Zstd(dict) and the
    * LZ4(dict) stand-in, as in the paper where the LZ4 dictionary is
    * trained by Zstd).
    */
  def zstdDict(name: String): Array[Byte] =
    zstdDicts.getOrElseUpdate(name, {
      val sample = PatternExtractor.sample(records(name),
        PatternExtractor.Config(sampleSize = 1000))
      DictTraining.zstdDict(sample.map(_.getBytes(UTF_8)))
    })

  /** Standalone FSST table trained on whole records (the FSST baseline). */
  def fsst(name: String): FsstTable =
    fsstTables.getOrElseUpdate(name, {
      val sample = PatternExtractor.sample(records(name),
        PatternExtractor.Config(sampleSize = 2000))
      Fsst.train(sample.map(_.getBytes(UTF_8)))
    })
}
