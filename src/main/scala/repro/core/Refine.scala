package repro.core

import scala.collection.mutable

/** Structure refinement (paper §4.3): array unfolding and structure
  * shifting, applied to the top-M templates during the evaluation step.
  * Each revision is kept only when it improves the regularity score.
  */
object Refine {

  /** All single-node array revisions of a template:
    *
    *  - full unfold: `({A}x)*{A}y` -> `A x A x ... A y` with exactly k
    *    copies — proposed for every k in `fullCounts` (the distinct observed
    *    repetition counts for the array; proposing them all lets the best
    *    one win by score even when counts vary);
    *  - partial unfold: `({A}x)*{A}y` -> `A x ({A}x)*{A}y` — peels one
    *    leading element while keeping the non-deterministic suffix
    *    (the paper's mechanism for "regular fields mixed with text fields").
    */
  def unfoldCandidates(
      t: Template,
      observedCounts: Map[String, Set[Int]]
  ): Vector[Template] = {
    val out = Vector.newBuilder[Template]

    def rewriteAt(items: Vector[TElem], prefix: String): Vector[(Vector[TElem], String)] = {
      val res = Vector.newBuilder[(Vector[TElem], String)]
      var arrIdx = 0
      items.zipWithIndex.foreach {
        case (TArray(body, x, y), i) =>
          val apath = s"${prefix}a$arrIdx"
          arrIdx += 1
          // bound the fan-out: propose at most the 4 smallest observed counts
          val counts = observedCounts.getOrElse(apath, Set.empty).toVector.sorted.take(4).toSet
          // full unfolds
          for (k <- counts if k >= 1 && k <= 64) {
            val flat = Vector.tabulate(k) { j =>
              if (j < k - 1) body :+ TChar(x) else body :+ TChar(y)
            }.flatten
            res += ((items.patch(i, flat, 1), apath))
          }
          // partial unfold (needs at least 2 elements everywhere to stay valid)
          if (counts.nonEmpty && counts.min >= 2) {
            val peeled = (body :+ TChar(x)) ++ Vector(TArray(body, x, y))
            res += ((items.patch(i, peeled, 1), apath))
          }
          // recurse into the body
          for ((newBody, p) <- rewriteAt(body, s"$apath."))
            res += ((items.updated(i, TArray(newBody, x, y)), p))
        case _ => ()
      }
      res.result()
    }

    for ((items, _) <- rewriteAt(t.items, "")) out += Template(items)
    out.result().distinctBy(_.canonical)
  }

  /** Observed repetition counts per array path from a parse scan. */
  def observedCounts(sc: Mdl.ParseScan): Map[String, Set[Int]] = {
    val m = mutable.HashMap.empty[String, mutable.Set[Int]]
    for ((_, _, r) <- sc.records; (p, k) <- r.arrayCounts)
      m.getOrElseUpdate(p, mutable.Set.empty) += k
    m.iterator.map { case (k, v) => k -> v.toSet }.toMap
  }

  /** Collapse a template that is k >= 2 exact copies of the same top-level
    * line-group sequence into a single copy. The boundary enumeration
    * necessarily produces such k-fold self-concatenations of every
    * single-record template (a pair of records is also a "candidate
    * record"), and under unique coverage they tie with the true template —
    * this canonicalization removes the redundancy before evaluation.
    */
  def periodReduce(t: Template): Template = {
    Template.lineGroups(t.items) match {
      case Some(segments) if segments.length > 1 =>
        val n = segments.length
        var p = 1
        while (p <= n / 2) {
          if (n % p == 0 && (p until n).forall(i => segments(i) == segments(i % p)))
            return Template(segments.take(p).flatten)
          p += 1
        }
        t
      case _ => t
    }
  }

  /** Cyclic line shifts of a multi-line template (paper §4.3.2). Only
    * top-level '\n' literals are cut points; templates whose newlines sit
    * inside arrays are not shiftable.
    */
  def cyclicShifts(t: Template): Vector[Template] = {
    Template.lineGroups(t.items) match {
      case Some(segments) if segments.length > 1 =>
        (1 until segments.length).toVector.map { s =>
          Template((segments.drop(s) ++ segments.take(s)).flatten)
        }
      case _ => Vector.empty
    }
  }

  /** Apply the RefineST loop of Algorithm 2: repeatedly take the best
    * score-improving unfold; then resolve shifting ambiguity by earliest
    * first occurrence in the data.
    */
  def refine(
      t0: Template,
      lines: IndexedSeq[String],
      maxSpan: Int,
      minCoverage: Double = 0.0,
      skipIfAbove: Double = Double.MaxValue
  ): (Template, Mdl.ParseScan, Double) = {
    var t = periodReduce(t0)
    var sc = Mdl.scan(t, lines, maxSpan)
    var score = Mdl.score(t, sc, lines)
    // templates below the acceptance coverage can never win, and templates
    // scoring far above the best candidate seen so far cannot recover
    // through unfolding (unfolds only sharpen field typing) — skip the
    // expensive loop for both
    if (sc.coverage < minCoverage || score > skipIfAbove) return (t, sc, score)
    var improved = true
    var rounds = 0
    while (improved && rounds < 5) {
      improved = false
      rounds += 1
      val cands = unfoldCandidates(t, observedCounts(sc))
      var best: Option[(Template, Mdl.ParseScan, Double)] = None
      for (c <- cands) {
        val csc = Mdl.scan(c, lines, maxSpan)
        if (csc.records.nonEmpty) {
          val cs = Mdl.score(c, csc, lines)
          if (cs < score && best.forall(_._3 > cs)) best = Some((c, csc, cs))
        }
      }
      best.foreach { case (c, csc, cs) =>
        t = c; sc = csc; score = cs; improved = true
      }
    }
    // structure shifting: among cyclic variants with comparable score,
    // pick the earliest first occurrence (ties keep the original)
    val shifts = cyclicShifts(t)
    if (shifts.nonEmpty) {
      val origFirst = sc.records.headOption.map(_._1).getOrElse(Int.MaxValue)
      var bestT = t; var bestSc = sc; var bestScore = score; var bestFirst = origFirst
      for (s <- shifts) {
        val ssc = Mdl.scan(s, lines, maxSpan)
        if (ssc.records.nonEmpty) {
          val sscore = Mdl.score(s, ssc, lines)
          val first = ssc.records.head._1
          if (sscore <= bestScore * 1.02 && first < bestFirst) {
            bestT = s; bestSc = ssc; bestScore = sscore; bestFirst = first
          }
        }
      }
      t = bestT; sc = bestSc; score = bestScore
    }
    (t, sc, score)
  }
}
