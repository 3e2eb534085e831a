package repro.core

/** Wall-clock of the three DATAMARAN steps plus extraction (paper Table 3).
  * Milliseconds, accumulated across interleaved-type iterations.
  */
final case class StepTimings(
    generationMs: Long,
    pruningMs: Long,
    evaluationMs: Long,
    extractionMs: Long
) {
  def +(o: StepTimings): StepTimings = StepTimings(
    generationMs + o.generationMs,
    pruningMs + o.pruningMs,
    evaluationMs + o.evaluationMs,
    extractionMs + o.extractionMs
  )
  def searchMs: Long = generationMs + pruningMs + evaluationMs
  def totalMs: Long = searchMs + extractionMs
}
object StepTimings { val zero: StepTimings = StepTimings(0, 0, 0, 0) }

/** One accepted record type. */
final case class InferredType(template: Template, mdlScore: Double, sampleCoverage: Double)

/** Result of the structure search (no full-data extraction yet). */
final case class Inference(
    types: Vector[InferredType],
    timings: StepTimings,
    candidatesAfterGeneration: Int, // the paper's K (on the last iteration)
    sampleLineCount: Int
)

/** One extracted record in the final unified extraction pass. */
final case class RecordInstance(typeIdx: Int, start: Int, span: Int, parsed: Parsed)

/** The DATAMARAN algorithm (paper §4): Generation -> Pruning -> Evaluation,
  * iterated over the residual for interleaved record types (§9.1), followed
  * by a unified LL(1) extraction pass ([[Datamaran.extract]] locally,
  * [[SparkExtract]] distributed).
  */
object Datamaran {

  private def timed[A](f: => A): (A, Long) = {
    val t0 = System.nanoTime()
    val r = f
    (r, (System.nanoTime() - t0) / 1000000L)
  }

  /** Structure search over (a sample of) `lines`. */
  def infer(lines: IndexedSeq[String], p: DmParams = DmParams()): Inference = {
    val sample = Generation.sampleLines(lines, p)
    var residual = sample
    val accepted = Vector.newBuilder[InferredType]
    val acceptedCanon = scala.collection.mutable.Set.empty[String]
    var timings = StepTimings.zero
    var lastK = 0
    val sampleTotalChars = sample.iterator.map(_.length + 1L).sum

    var iter = 0
    var done = false
    while (!done && iter < p.maxRecordTypes) {
      iter += 1
      // ---- Generation ----
      // generation runs on a (possibly smaller) chunk subsample of the
      // evaluation sample — the paper's S_data bound applies to both steps
      val (stats, genMs) = timed {
        val genLines = Generation.sampleLines(
          residual, p.copy(sampleMaxChars = math.min(p.genSampleMaxChars, p.sampleMaxChars)))
        if (p.exhaustive) Generation.exhaustiveSearch(genLines, p)
        else Generation.greedySearch(genLines, p)
      }
      lastK = stats.length
      // genST already enforced the alpha threshold relative to the scanned
      // sample (Assumption 1); only exclude already-accepted templates here
      val fresh = stats.filterNot(s => acceptedCanon.contains(s.template.canonical))
      if (fresh.isEmpty) {
        timings += StepTimings(genMs, 0, 0, 0)
        done = true
      } else {
        // ---- Pruning ----
        // canonicalize k-fold self-concatenations to their period first:
        // stacks tie with the true template under unique coverage and would
        // otherwise crowd out the top-M and waste evaluation time
        val (top, pruneMs) = timed {
          val collapsed = Generation.dedupe(
            fresh.map(s => s.copy(template = Refine.periodReduce(s.template))))
          Generation.prune(collapsed, p)
        }
        // ---- Evaluation ----
        val ((best, noiseDl), evalMs) = timed {
          val noiseDl = Mdl.noiseBaseline(residual)
          (evaluateBest(top, residual, p, noiseDl), noiseDl)
        }
        timings += StepTimings(genMs, pruneMs, evalMs, 0)

        best match {
          case Some((t, sc, score))
              if score < noiseDl * (1 - p.minSavings) &&
                sc.anchoredChars >= p.alpha * sampleTotalChars &&
                !acceptedCanon.contains(t.canonical) =>
            accepted += InferredType(t, score, sc.recordChars.toDouble / sampleTotalChars)
            acceptedCanon += t.canonical
            // residual: the sample minus lines covered by this type
            val covered = Array.fill(residual.length)(false)
            for ((st, span, _) <- sc.records; i <- st until (st + span)) covered(i) = true
            residual = residual.indices.collect {
              case i if !covered(i) => residual(i)
            }.toIndexedSeq
            if (residual.isEmpty) done = true
          case _ =>
            done = true
        }
      }
    }
    Inference(accepted.result(), timings, lastK, sample.length)
  }

  /** Evaluation step over pruned candidates (in priority order): refine
    * each (with the coverage guard and a can't-win shortcut against the
    * best score so far), then select by near-tie rules: candidates whose
    * description-length SAVINGS over the all-noise baseline are within the
    * tie band of the best are considered equal; ties prefer more records
    * (rejects k-fold self-concatenations), then earliest first occurrence
    * (structure shifting), then score, then the shorter template. The band
    * is relative to the savings, not total DL, so noise-dominated datasets
    * do not drown the signal.
    */
  def evaluateBest(
      top: Vector[TemplateStat],
      lines: IndexedSeq[String],
      p: DmParams,
      noiseDl: Double
  ): Option[(Template, Mdl.ParseScan, Double)] = {
    var bestSoFar = Double.MaxValue
    val evaluated = top.flatMap { s =>
      val (t, sc, score) =
        Refine.refine(s.template, lines, p.maxSpan, p.alpha, bestSoFar * 1.6)
      if (score < bestSoFar) bestSoFar = score
      if (sc.records.isEmpty) None
      else Some((t, sc, score))
    }
    if (evaluated.isEmpty) None
    else {
      val minScore = evaluated.map(_._3).min
      val cut = minScore + p.mdlTieBand * math.max(1.0, noiseDl - minScore)
      val band = evaluated.filter(_._3 <= cut)
      Some(band.minBy { case (t, sc, score) =>
        (-sc.records.length, sc.records.head._1, score, t.encodedLength)
      })
    }
  }

  /** Unified final extraction: one left-to-right scan over all lines; at
    * each position the accepted templates are tried in acceptance order
    * (the first iteration's type has priority) with their smallest matching
    * span; unmatched lines are noise. [[SparkExtract.extract]] implements
    * the same contract distributed and is tested for equivalence.
    */
  def extract(
      lines: IndexedSeq[String],
      templates: Vector[Template],
      maxSpan: Int
  ): Vector[RecordInstance] = {
    val out = Vector.newBuilder[RecordInstance]
    var i = 0
    while (i < lines.length) {
      matchAt(lines, i, templates, maxSpan) match {
        case Some((tid, span)) =>
          val parsed = Matcher.parse(templates(tid), Matcher.joinLines(lines, i, span)).get
          out += RecordInstance(tid, i, span, parsed)
          i += span
        case None =>
          i += 1
      }
    }
    out.result()
  }

  /** Shared match rule: first template (in priority order) with a smallest
    * matching span at `start`.
    */
  def matchAt(
      lines: IndexedSeq[String],
      start: Int,
      templates: Vector[Template],
      maxSpan: Int
  ): Option[(Int, Int)] = {
    var tid = 0
    while (tid < templates.length) {
      Matcher.smallestSpanAt(templates(tid), lines, start, maxSpan) match {
        case Some(span) => return Some((tid, span))
        case None       => ()
      }
      tid += 1
    }
    None
  }

  /** Convenience: full pipeline on in-memory lines, timing extraction too. */
  def run(lines: IndexedSeq[String], p: DmParams = DmParams()): (Inference, Vector[RecordInstance]) = {
    val inf = infer(lines, p)
    val (recs, exMs) = timed(extract(lines, inf.types.map(_.template), p.maxSpan))
    (inf.copy(timings = inf.timings + StepTimings(0, 0, 0, exMs)), recs)
  }
}
