package repro.core

/** Structure-template AST (paper §3.3, Assumption 3).
  *
  * A structure template is a restricted regular expression over record
  * templates:
  *
  *  - `Struct`: a sequence of elements — literal characters, field
  *    placeholders, or nested templates. Modelled here as `Vector[TElem]`.
  *  - `Array`: `({A}x)*{A}y` — one or more instances of a body `A`
  *    separated by the single character `x` and terminated by the single
  *    character `y`, with `x != y` (this is what makes the grammar LL(1)).
  *
  * A field placeholder ('F' in the paper) stands for a non-empty run of
  * characters that are not formatting characters of this template.
  */
sealed trait TElem extends Serializable

/** Field placeholder — the paper's 'F'. */
case object TField extends TElem

/** A literal formatting character (member of the template's RT-CharSet). */
final case class TChar(c: Char) extends TElem

/** Array-type regular expression `({body}sep)*{body}term`, `sep != term`.
  * Matches one or more instances of `body`; the terminator is consumed.
  */
final case class TArray(body: Vector[TElem], sep: Char, term: Char) extends TElem {
  require(sep != term, s"array separator and terminator must differ (got '$sep')")
  require(body.nonEmpty, "array body must be non-empty")
}

/** A complete structure template: the top-level Struct's element sequence.
  *
  * Invariant (checked by [[Template.apply]]): the template ends with '\n' —
  * either a literal `TChar('\n')` or an array terminated by '\n' — because
  * instantiated records always end at a line boundary (Definition 2.4).
  */
final case class Template private (items: Vector[TElem]) extends Serializable {

  /** Literal formatting characters of this template (its effective
    * RT-CharSet). Field values matched by this template never contain any
    * of these characters — that is Assumption 2 operationalized, and it is
    * what the LL(1) field scanner stops on.
    */
  lazy val charset: Set[Char] = {
    def walk(es: Vector[TElem], acc: Set[Char]): Set[Char] =
      es.foldLeft(acc) {
        case (s, TChar(c))          => s + c
        case (s, TArray(b, x, y))   => walk(b, s + x + y)
        case (s, TField)            => s
      }
    walk(items, Set('\n'))
  }

  /** Unambiguous canonical encoding — the hash key used by the generation
    * step's hash-table. Control characters .. cannot occur in
    * log text (RT-CharSet-Candidate is printable + tab), so the encoding is
    * injective.
    */
  lazy val canonical: String = Template.encode(items)

  /** Human-readable form, e.g. `F,"(F,)*F",F\n`. */
  lazy val pretty: String = Template.pretty(items)

  /** Number of '\n' a matching record must contain at minimum (arrays count
    * with a single body instance). This is the minimum line span.
    */
  lazy val minLines: Int = Template.countMinNewlines(items)

  /** True if every match has exactly `minLines` lines (no '\n' inside any
    * array body or separator position that can repeat).
    */
  lazy val fixedLineSpan: Boolean = !Template.newlineInRepeatablePosition(items)

  /** Total number of field placeholders, counting array bodies once. */
  lazy val fieldCount: Int = {
    def walk(es: Vector[TElem]): Int = es.map {
      case TField         => 1
      case TChar(_)       => 0
      case TArray(b, _, _) => walk(b)
    }.sum
    walk(items)
  }

  /** Length of the canonical string — the `len(ST)` of the MDL formula. */
  def encodedLength: Int = canonical.length

  override def toString: String = pretty
}

object Template {

  private val FieldMark  = '\u0001'
  private val ArrOpen    = '\u0002'
  private val ArrClose   = '\u0003'

  def apply(items: Vector[TElem]): Template = {
    require(items.nonEmpty, "empty template")
    new Template(items)
  }

  /** Construct without the trailing-newline requirement check — the factory
    * for all real templates; kept as one entry point so the invariant is
    * documented in a single place. Templates produced from record text always
    * end in '\n' because the text does.
    */
  def ofRecord(items: Vector[TElem]): Template = apply(items)

  private[core] def encode(items: Vector[TElem]): String = {
    val sb = new StringBuilder
    def walk(es: Vector[TElem]): Unit = es.foreach {
      case TField          => sb.append(FieldMark)
      case TChar(c)        => sb.append(c)
      case TArray(b, x, y) =>
        sb.append(ArrOpen); walk(b); sb.append(ArrClose).append(x).append(y)
    }
    walk(items)
    sb.toString
  }

  /** Inverse of [[encode]]; used to ship templates through Spark closures as
    * plain strings and by tests.
    */
  def decode(s: String): Template = {
    var i = 0
    def walk(stopAtClose: Boolean): Vector[TElem] = {
      val out = Vector.newBuilder[TElem]
      var done = false
      while (!done && i < s.length) {
        s.charAt(i) match {
          case FieldMark => out += TField; i += 1
          case ArrOpen =>
            i += 1
            val body = walk(stopAtClose = true)
            // cursor now just past ArrClose
            val x = s.charAt(i); val y = s.charAt(i + 1); i += 2
            out += TArray(body, x, y)
          case ArrClose =>
            require(stopAtClose, s"unbalanced array close in ${s}")
            i += 1; done = true
          case c => out += TChar(c); i += 1
        }
      }
      out.result()
    }
    Template(walk(stopAtClose = false))
  }

  private[core] def pretty(items: Vector[TElem]): String = {
    val sb = new StringBuilder
    def walk(es: Vector[TElem]): Unit = es.foreach {
      case TField          => sb.append('F')
      case TChar(c)        => sb.append(Chars.show(c))
      case TArray(b, x, y) =>
        sb.append('('); walk(b); sb.append(Chars.show(x)); sb.append(")*")
        walk(b); sb.append(Chars.show(y))
    }
    walk(items)
    sb.toString
  }

  /** True iff a template item consumes the end of a line: a literal '\n'
    * or an array whose terminator is '\n' (the terminator is part of the
    * array node).
    */
  def endsLine(it: TElem): Boolean = it match {
    case TChar('\n')        => true
    case TArray(_, _, '\n') => true
    case _                  => false
  }

  /** Split a template's items into its top-level line groups (each ending
    * with a line-ending item), or None when the template does not decompose
    * into whole lines (e.g. a trailing partial line, or '\n' inside an
    * array body/separator).
    */
  def lineGroups(items: Vector[TElem]): Option[Vector[Vector[TElem]]] = {
    val out = Vector.newBuilder[Vector[TElem]]
    val cur = Vector.newBuilder[TElem]
    var curEmpty = true
    items.foreach { it =>
      cur += it
      curEmpty = false
      if (endsLine(it)) {
        out += cur.result()
        cur.clear()
        curEmpty = true
      }
    }
    if (!curEmpty) None else Some(out.result())
  }

  private def countMinNewlines(items: Vector[TElem]): Int = items.map {
    case TChar('\n')      => 1
    case TChar(_) | TField => 0
    case TArray(b, x, y)  =>
      countMinNewlines(b) + (if (y == '\n') 1 else 0)
  }.sum

  private def newlineInRepeatablePosition(items: Vector[TElem]): Boolean =
    items.exists {
      case TArray(b, x, _) =>
        x == '\n' || countMinNewlines(b) > 0 || newlineInRepeatablePosition(b)
      case _ => false
    }
}
