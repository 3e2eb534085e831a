package repro.core

import scala.collection.mutable

/** Steps 3–4 of the generation step (paper §4.1, Figure 10):
  *
  *  - [[recordTemplate]]: extract the record template from an instantiated
  *    record given an RT-CharSet (Assumption 2 makes this possible — every
  *    maximal run of non-formatting characters is one field value).
  *  - [[reduce]]: fold the record template into its *minimal structure
  *    template* by repeatedly rewriting `A x A x … A y` (x, y single
  *    characters, x != y) into the array form `({A}x)*{A}y`. Two records of
  *    the same type that differ only in repeat counts reduce to the same
  *    minimal template — the property the generation hash-table relies on.
  */
object TemplateOps {

  /** Upper bound on the array-body length (in items) the reducer searches.
    * Real record structures have short repeating units (a list element is
    * a handful of fields and separators); the cap bounds the
    * O(n · maxUnit · n) scan for degenerate candidates.
    */
  val MaxUnitItems = 12

  /** Candidates whose item sequence is longer than this are discarded by the
    * generation step (they are never plausible single records).
    */
  val MaxTemplateItems = 800

  /** Extract the record template of `text` under formatting set `cs`.
    * '\n' is always formatting. Non-empty maximal runs of non-formatting
    * characters become single `TField`s; empty runs produce nothing (fields
    * are non-empty by construction, see Matcher).
    */
  def recordTemplate(text: String, cs: Set[Char]): Vector[TElem] = {
    val out = Vector.newBuilder[TElem]
    var inField = false
    var i = 0
    while (i < text.length) {
      val ch = text.charAt(i)
      if (ch == '\n' || cs.contains(ch)) {
        out += TChar(ch); inField = false
      } else if (!inField) {
        out += TField; inField = true
      }
      i += 1
    }
    out.result()
  }

  /** One leftmost-shortest array fold, or None if no fold applies.
    *
    * Searches for the pattern `A x A x … A y` with k >= 1 separators, where
    * `A` is a non-empty item sequence, `x`/`y` are literal characters and
    * `x != y`; replaces it with `TArray(A, x, y)`. Scanning order (ascending
    * start position, then ascending body length) makes reduction
    * deterministic, so identical records always reduce identically.
    */
  /** Find the leftmost fold starting at or after `from` and apply it in
    * place; returns the fold start position, or -1.
    */
  private def foldOnceFrom(buf: mutable.ArrayBuffer[TElem], from: Int): Int = {
    val n = buf.length
    var i = from
    while (i < n) {
      val maxA = math.min(MaxUnitItems, (n - i - 2) / 2)
      var a = 1
      while (a <= maxA) {
        buf(i + a) match {
          case TChar(x) =>
            // count k repeats of (A x), greedily
            var pos = i
            var k = 0
            var cont = true
            while (cont && pos + a < n) {
              if (sliceEq(buf, pos, i, a) && buf(pos + a) == TChar(x)) {
                k += 1; pos += a + 1
              } else cont = false
            }
            if (k >= 1 && pos + a < n && sliceEq(buf, pos, i, a)) {
              buf(pos + a) match {
                case TChar(y) if y != x =>
                  val body = Vector.from(buf.view.slice(i, i + a))
                  buf.remove(i, pos + a + 1 - i)
                  buf.insert(i, TArray(body, x, y))
                  return i
                case _ => ()
              }
            }
          case _ => ()
        }
        a += 1
      }
      i += 1
    }
    -1
  }

  /** buf[at..at+len) == buf[ref..ref+len) */
  private def sliceEq(buf: mutable.ArrayBuffer[TElem], at: Int, ref: Int, len: Int): Boolean = {
    if (at == ref) return true
    var j = 0
    while (j < len) {
      if (buf(at + j) != buf(ref + j)) return false
      j += 1
    }
    true
  }

  /** Reduce to the minimal structure template: repeat the leftmost fold to
    * a fixpoint. After a fold at position i, scanning resumes a bounded
    * window to the left (new folds overwhelmingly appear at or after the
    * previous one); a final full pass from 0 guarantees the result is
    * globally fold-free, so the output is a true fixpoint and identical
    * inputs always reduce identically.
    */
  def reduce(items: Vector[TElem]): Vector[TElem] = {
    val buf = mutable.ArrayBuffer.from(items)
    var from = 0
    var confirming = false
    var done = false
    while (!done) {
      val hit = foldOnceFrom(buf, from)
      if (hit >= 0) {
        from = math.max(0, hit - 2 * MaxUnitItems)
        confirming = false
      } else if (from > 0 && !confirming) {
        from = 0
        confirming = true
      } else {
        done = true
      }
    }
    Vector.from(buf)
  }

  /** Full step-3+4 pipeline: record text + RT-CharSet -> minimal structure
    * template, or None when the candidate is implausible (too long, or no
    * field at all — a record with zero fields extracts nothing).
    *
    * Reduction is strictly PER LINE: the array form cannot legally span a
    * '\n' boundary anyway (identical '\n'-terminated line repeats would
    * need sep == term, which Assumption 3 forbids), and cross-line folds
    * only ever produced degenerate noise absorbers. Line-wise reduction
    * also makes a k-record concatenation exactly k copies of the
    * single-record template, which the period-reduction canonicalization
    * then collapses.
    */
  def minimalTemplate(text: String, cs: Set[Char]): Option[Template] =
    minimalCanonical(text, cs, new ReduceCaches).map {
      case (canon, _) => Template.decode(canon)
    }

  /** Per-line reduction cache for the fast generation path (few distinct
    * line shapes per charset, since field values collapse into the key).
    */
  final class ReduceCaches {
    val line = mutable.HashMap.empty[String, (Vector[TElem], String)]
  }

  /** Fast generation path: canonical minimal template + field-character
    * count. Each LINE's record template is reduced once per shape
    * (memoized); a multi-line candidate's template is the concatenation of
    * its per-line reductions (see [[minimalTemplate]] for why reduction
    * never crosses '\n').
    */
  def minimalCanonical(
      text: String,
      cs: Set[Char],
      caches: ReduceCaches
  ): Option[(String, Int)] = {
    var litChars = 0
    var hasField = false
    var totalItems = 0
    val encoded = new StringBuilder
    var lineStart = 0
    while (lineStart < text.length) {
      var nl = text.indexOf('\n', lineStart)
      if (nl < 0) nl = text.length - 1 // defensive; text always ends in '\n'
      val sb = new StringBuilder(nl - lineStart + 2)
      var inField = false
      var i = lineStart
      while (i <= nl) {
        val ch = text.charAt(i)
        if (ch == '\n' || cs.contains(ch)) {
          sb.append(ch); litChars += 1; inField = false
        } else if (!inField) {
          sb.append('\u0001'); inField = true; hasField = true
        }
        i += 1
      }
      val key = sb.toString
      val (items, enc) = caches.line.getOrElseUpdate(key, {
        val raw = key.iterator.map {
          case '\u0001' => TField
          case c        => TChar(c)
        }.toVector
        val red = if (raw.length > MaxTemplateItems) raw else reduce(raw)
        (red, Template.encode(red))
      })
      totalItems += items.length
      encoded.append(enc)
      lineStart = nl + 1
    }
    if (!hasField || totalItems > MaxTemplateItems) None
    else Some((encoded.toString, text.length - litChars))
  }

  /** Number of characters of `text` that are field content under `cs`
    * (record length minus formatting characters). Used by the assimilation
    * score's Non-Field-Coverage term.
    */
  def fieldCharCount(text: String, cs: Set[Char]): Int = {
    var cnt = 0
    var i = 0
    while (i < text.length) {
      val ch = text.charAt(i)
      if (ch != '\n' && !cs.contains(ch)) cnt += 1
      i += 1
    }
    cnt
  }
}
