package repro.eval

import repro.core._
import repro.baseline.RecordBreaker
import repro.loggen.{GtDataset, Label}

/** The paper's evaluation standard (§5.1, formalized in §9.3).
  *
  * An extraction is successful iff
  *
  *  (a) all record boundaries and record types are correctly identified
  *      (every ground-truth record is extracted with its exact line span;
  *      records of one ground-truth type map to exactly one extracted
  *      template; distinct ground-truth types map to distinct templates;
  *      and nothing else is reported as a record — the relational output
  *      must not contain noise rows), and
  *
  *  (b) every intended extraction target can be reconstructed from the
  *      extracted relation with the §9.3 operator set (Concat /
  *      GroupConcat / Trim / Append / DeleteCol / DeleteTable): here,
  *      a contiguous run of parsed segments — fields used whole, array
  *      instances as their glued text (GroupConcat+Append), literals as
  *      constants — whose concatenation equals the target after removing a
  *      constant prefix/suffix (Trim), with the same run and constants for
  *      every record of the type. Splitting a column is NOT allowed
  *      (otherwise the single-blob extraction would trivially pass).
  */
object Criteria {

  /** One extracted record in evaluation shape. */
  final case class EvalRecord(typeKey: String, start: Int, end: Int, segs: Vector[Seg])

  final case class Judgement(
      success: Boolean,
      reasons: List[String],
      foundNoStructure: Boolean
  )

  /** Adapt a DATAMARAN extraction. */
  def fromDatamaran(records: Vector[RecordInstance]): Vector[EvalRecord] =
    records.map(r => EvalRecord(s"dm${r.typeIdx}", r.start, r.start + r.span - 1, r.parsed.segs))

  /** Adapt a RecordBreaker extraction: every explained line is a
    * single-line record of its struct; unexplained lines fall into the
    * catch-all branch (PADS descriptions are total — errors become a
    * generic string branch, which is itself part of the output).
    */
  def fromRecordBreaker(res: RecordBreaker.RbResult, lines: IndexedSeq[String]): Vector[EvalRecord] = {
    val structured = res.structs.zipWithIndex.flatMap { case (s, sid) =>
      s.lineIdxs.map { i =>
        EvalRecord(s"rb$sid", i, i, RecordBreaker.parseLine(s, lines(i)).segs)
      }
    }
    val blob = res.unexplained.map { i =>
      EvalRecord("rb-catchall", i, i, Vector(FieldSeg("f0", lines(i)), LitSeg("\n")))
    }
    (structured ++ blob).sortBy(_.start)
  }

  /** Judge an extraction against ground truth. For NS-labelled datasets the
    * correct behaviour is to report no structure.
    */
  def judge(gt: GtDataset, extracted: Vector[EvalRecord]): Judgement = {
    val noStructure = extracted.isEmpty
    if (gt.spec.label == Label.NS)
      return Judgement(noStructure, if (noStructure) Nil else List("structure reported on NS dataset"), noStructure)

    val reasons = List.newBuilder[String]
    var ok = true

    // ---- criterion (a)
    val bySpan = extracted.map(r => (r.start, r.end) -> r).toMap
    val gtSpans = gt.records.map(r => (r.start, r.end)).toSet
    val missing = gt.records.filter(r => !bySpan.contains((r.start, r.end)))
    if (missing.nonEmpty) {
      ok = false
      reasons += s"${missing.length}/${gt.records.length} ground-truth records not extracted with exact boundaries (first: ${missing.head})"
    }
    val spurious = extracted.filterNot(r => gtSpans.contains((r.start, r.end)))
    if (spurious.nonEmpty) {
      ok = false
      reasons += s"${spurious.length} extracted records do not match any ground-truth record (first: start=${spurious.head.start})"
    }
    // type mapping: gt type -> exactly one template key; injective
    if (ok) {
      val mapping = gt.records
        .groupBy(_.typeName)
        .map { case (tn, rs) => tn -> rs.map(r => bySpan((r.start, r.end)).typeKey).distinct }
      for ((tn, keys) <- mapping if keys.length > 1) {
        ok = false
        reasons += s"ground-truth type $tn split across ${keys.length} extracted templates"
      }
      val inv = mapping.toVector.collect { case (tn, Vector(k)) => (k, tn) }
        .groupBy(_._1).map { case (k, pairs) => k -> pairs.map(_._2) }
      for ((k, tns) <- inv if tns.length > 1) {
        ok = false
        reasons += s"ground-truth types ${tns.mkString(",")} merged into one template"
      }
    }

    // ---- criterion (b)
    if (ok) {
      for ((tn, rs) <- gt.records.groupBy(_.typeName)) {
        val pairs = rs.map(r => (bySpan((r.start, r.end)).segs, r.targets.toMap))
        val shapes = pairs.map(_._1.map(segKind)).distinct
        if (shapes.length > 1) {
          ok = false
          reasons += s"type $tn: segment shapes differ across records"
        } else {
          // search over a bounded sample of records: a (run, d0, d1) that
          // holds on 120 records with variable-width fields is decisive,
          // and keeps judging O(datasets) not O(corpus size)
          val sample =
            if (pairs.length <= 120) pairs
            else pairs.take(60) ++ pairs.takeRight(60)
          val targetNames = rs.head.targets.map(_._1)
          for (name <- targetNames) {
            if (!reconstructible(sample.map { case (s, t) => (s, t(name)) })) {
              ok = false
              reasons += s"type $tn: target '$name' not reconstructible from extracted fields"
            }
          }
        }
      }
    }
    Judgement(ok, reasons.result(), noStructure)
  }

  private def segKind(s: Seg): String = s match {
    case LitSeg(t)        => s"L:$t"
    case FieldSeg(p, _)   => s"F:$p"
    case ArraySeg(p, _, _) => s"A:$p"
  }

  /** Is there a contiguous segment run [a..b] and constants (d0, d1) such
    * that for EVERY record, concat(segs[a..b]).drop(d0).dropRight(d1) equals
    * the target value?
    */
  def reconstructible(records: Vector[(Vector[Seg], String)]): Boolean = {
    if (records.isEmpty) return true
    val k = records.head._1.length
    val (segs0, t0) = records.head
    var a = 0
    while (a < k) {
      var b = a
      while (b < k) {
        val s0 = concat(segs0, a, b)
        // candidate (d0, d1) pairs from occurrences in the first record
        var from = 0
        var idx = s0.indexOf(t0, from)
        while (idx >= 0) {
          val d0 = idx
          val d1 = s0.length - idx - t0.length
          if (records.forall { case (segs, t) =>
              val s = concat(segs, a, b)
              s.length >= d0 + d1 + t.length &&
              s.length - d0 - d1 == t.length &&
              s.regionMatches(d0, t, 0, t.length)
            }) return true
          from = idx + 1
          idx = s0.indexOf(t0, from)
        }
        b += 1
      }
      a += 1
    }
    false
  }

  private def concat(segs: Vector[Seg], a: Int, b: Int): String = {
    val sb = new StringBuilder
    var i = a
    while (i <= b) { sb.append(segs(i).text); i += 1 }
    sb.toString
  }
}
