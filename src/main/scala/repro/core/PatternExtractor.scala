package repro.core

import scala.util.Random

/** Offline pattern-extraction phase (paper Fig. 1a): sample → clusters →
  * patterns with per-field encoders → dictionary.
  */
object PatternExtractor {

  final case class Config(
      /** Target number of patterns (k of Problem 1; "pattern size"). */
      k: Int = 32,
      /** Records drawn from the corpus for clustering. */
      sampleSize: Int = 150,
      /** Pattern length cap — longer records keep a trailing wildcard. */
      maxPatternLen: Int = 1024,
      criterion: Clustering.Criterion = Clustering.Criterion.EncodingLengthBased,
      usePruning: Boolean = true,
      /** Train an FSST table on residuals for the `PBC_F` variant. */
      withFsst: Boolean = false,
      /** Records matched against the patterns to calibrate field
        * encoders. Clustering samples are small (the DP is O(S²·n·m)),
        * so fixed-shape encoders chosen from a handful of captures can
        * reject valid field values at compression time, cascading into
        * outliers; matching is cheap, so encoders are selected from a
        * much larger capture sample.
        */
      calibrationSize: Int = 1000,
      seed: Long = 42L
  )

  /** Deterministic sample of `cfg.sampleSize` records. */
  def sample(records: Seq[String], cfg: Config): Vector[String] = {
    if (records.size <= cfg.sampleSize) records.toVector
    else {
      val rnd = new Random(cfg.seed)
      val idx = rnd.shuffle(records.indices.toVector).take(cfg.sampleSize).sorted
      idx.map(records.apply)
    }
  }

  /** Extract the dictionary from a corpus.
    *
    * Per cluster: wildcards whose fields have observed values get the
    * cheapest encoder accepting all of them (paper Table 1); clusters
    * whose pattern degenerates (no literals) are dropped, their records
    * served by other patterns or the outlier path.
    *
    * Besides the k primary clusters, the merging is continued to a small
    * number of *coarse* clusters whose (more general, shorter-literal)
    * patterns are appended as fallbacks. Specific patterns still win —
    * matching is longest-literal-first — but records that drift from the
    * sampled value shapes degrade to a general pattern instead of the
    * raw outlier path. This keeps the outlier rate low with the small
    * samples used here (the paper uses multi-MB samples and re-triggers
    * extraction when the outlier counter crosses a threshold).
    */
  def train(records: Seq[String], cfg: Config = Config()): PatternDictionary = {
    require(records.nonEmpty, "cannot train on an empty corpus")
    val samp = sample(records, cfg)
    val clusterCfg = Clustering.Config(cfg.k, cfg.maxPatternLen, cfg.criterion, cfg.usePruning)
    val clusters = Clustering.cluster(samp, clusterCfg)
    val coarse = Clustering.mergeDown(clusters, math.max(2, cfg.k / 4), clusterCfg)

    // Dedupe patterns, order by descending literal length (longest-match-
    // first at compression time), drop degenerate all-wildcard patterns.
    val patterns = (clusters ++ coarse)
      .filter(_.pattern.litLen > 0)
      .groupBy(_.pattern.tokens)
      .values.map(_.head)
      .toVector
      .sortBy(c => (-c.pattern.litLen, c.pattern.glob))

    // Calibration: match a larger sample through the pattern list the way
    // the compressor will (longest-first glob match) and collect captures.
    val calib = sample(records, cfg.copy(sampleSize = cfg.calibrationSize, seed = cfg.seed + 1))
    val captures: Map[Int, Vector[Vector[String]]] = calib
      .flatMap { r =>
        patterns.indices.iterator
          .map(i => i -> patterns(i).pattern.matchRecord(r))
          .collectFirst { case (i, Some(caps)) => i -> caps }
      }
      .groupMap(_._1)(_._2)

    val compiled = patterns.zipWithIndex.flatMap { case (c, i) =>
      // calibration captures preferred; members as fallback for patterns
      // shadowed by longer ones during calibration
      val caps = captures.getOrElse(i, c.members.flatMap(m => c.pattern.matchRecord(m)))
      if (caps.isEmpty) None
      else {
        val encoders = (0 until c.pattern.numFields).map { f =>
          FieldEncoder.select(caps.map(_(f)))
        }.toVector
        Some(CompiledPattern(c.pattern, encoders))
      }
    }
    val unique = compiled

    val fsst =
      if (!cfg.withFsst) None
      else {
        // Train on residual field values + outliers of the sample.
        val chunks = samp.flatMap { r =>
          unique.iterator
            .map(cp => cp.pattern.matchRecord(r))
            .collectFirst { case Some(caps) => caps }
            .getOrElse(Vector(r))
        }.map(_.getBytes("UTF-8"))
        Some(repro.fsst.Fsst.train(chunks))
      }

    PatternDictionary(unique, fsst)
  }
}
