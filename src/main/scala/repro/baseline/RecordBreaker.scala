package repro.baseline

import repro.core._

/** Reimplementation of RecordBreaker [3] (the unsupervised adaptation of
  * Fisher et al.'s LearnPADS), as the paper's comparison baseline (§5.3.2).
  *
  * RecordBreaker embodies exactly the two extra assumptions of paper
  * Table 1 that DATAMARAN drops:
  *
  *  - Assumption 4 (Boundary): every record is one line — record boundaries
  *    are known beforehand;
  *  - Assumption 5 (Tokenization): RT-CharSet is fixed in advance — the
  *    lexer treats EVERY special character as formatting, for every record
  *    (`RT-CharSet(R) = RT-CharSet-Candidate`).
  *
  * Under those assumptions its structure inference is the same
  * summarization idea as Fisher's: tokenize each line with the fixed lexer,
  * reduce the token sequence to a minimal struct/array template, and group
  * lines by template (the union type-constructor: each group is one
  * inferred structure, emitted as its own table). Reusing DATAMARAN's
  * template machinery for the shared parts isolates the comparison to the
  * assumptions themselves, which is the paper's claim.
  *
  * `minCoverage` mirrors RecordBreaker's MinCoverage knob: groups below the
  * threshold are not reported as structures (their lines are left
  * unexplained), matching its behaviour of discarding low-support branches.
  */
object RecordBreaker {

  /** One inferred structure: a single-line template and the lines (by
    * index) that belong to it.
    */
  final case class RbStruct(template: Template, lineIdxs: Vector[Int])

  final case class RbResult(structs: Vector[RbStruct], unexplained: Vector[Int])

  /** The fixed lexer's RT-CharSet: all special characters (Assumption 5). */
  val FixedCharSet: Set[Char] = Chars.Candidates

  def run(lines: IndexedSeq[String], minCoverage: Double = 0.02): RbResult = {
    val byCanon = scala.collection.mutable.LinkedHashMap
      .empty[String, scala.collection.mutable.ArrayBuffer[Int]]
    val unexplained = Vector.newBuilder[Int]
    lines.indices.foreach { i =>
      TemplateOps.minimalTemplate(lines(i) + "\n", FixedCharSet) match {
        case Some(t) =>
          byCanon.getOrElseUpdate(t.canonical, scala.collection.mutable.ArrayBuffer.empty) += i
        case None =>
          unexplained += i // blank or field-less line
      }
    }
    val thresh = math.max(1.0, minCoverage * lines.length)
    val structs = Vector.newBuilder[RbStruct]
    for ((canon, idxs) <- byCanon) {
      if (idxs.length >= thresh)
        structs += RbStruct(structOrArray(Template.decode(canon), idxs, lines), idxs.toVector)
      else
        unexplained ++= idxs
    }
    RbResult(structs.result(), unexplained.result().sorted)
  }

  /** Fisher's struct-vs-array decision: a token group whose repetition count
    * is constant across all chunks is a struct (each repetition is its own
    * field); a varying count stays an array/list. Applied per cluster,
    * bottom-up, until no array has a constant count.
    */
  private def structOrArray(
      t0: Template,
      idxs: Iterable[Int],
      lines: IndexedSeq[String]
  ): Template = {
    var t = t0
    var changed = true
    while (changed) {
      changed = false
      val counts = scala.collection.mutable.HashMap.empty[String, scala.collection.mutable.Set[Int]]
      for (i <- idxs; p <- Matcher.parse(t, lines(i) + "\n").iterator; (path, k) <- p.arrayCounts)
        counts.getOrElseUpdate(path, scala.collection.mutable.Set.empty) += k
      val constant = counts.collectFirst {
        case (path, ks) if ks.size == 1 && ks.head <= 64 => (path, ks.head)
      }
      constant match {
        case Some((path, k)) =>
          // prefer the FULL unfold (fewest remaining array nodes)
          val unfolded = repro.core.Refine.unfoldCandidates(t, Map(path -> Set(k)))
            .sortBy(c => arrayNodeCount(c.items))
            .find(c => Matcher.parse(c, lines(idxs.head) + "\n").isDefined)
          unfolded match {
            case Some(u) if u.canonical != t.canonical => t = u; changed = true
            case _ => ()
          }
        case None => ()
      }
    }
    t
  }

  private def arrayNodeCount(items: Vector[TElem]): Int = items.map {
    case TArray(b, _, _) => 1 + arrayNodeCount(b)
    case _               => 0
  }.sum

  /** Parse a line against its struct's template (always succeeds for lines
    * grouped under it). Used by the evaluation criterion.
    */
  def parseLine(s: RbStruct, line: String): Parsed =
    Matcher.parse(s.template, line + "\n").getOrElse(
      sys.error(s"RecordBreaker line failed to re-parse under its own template")
    )
}
