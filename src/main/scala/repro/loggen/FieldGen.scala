package repro.loggen

import scala.util.Random

/** Deterministic field-value generators for the synthetic log corpus.
  * Every generator is a pure function of the dataset's `Random`, so a
  * dataset is fully determined by its spec + seed (paper §5.3: the corpus
  * is fixed before any analysis).
  */
object FieldGen {

  type Gen = Random => String

  /** Pseudo-words: pronounceable, open vocabulary (no tiny enum that MDL
    * could exploit), letters only.
    */
  val word: Gen = { r =>
    val syl = Array("ba", "co", "di", "fu", "ga", "hi", "jo", "ka", "lu",
      "me", "no", "pa", "qi", "ru", "se", "ti", "vo", "wa", "xe", "zu")
    val n = 2 + r.nextInt(3)
    (0 until n).map(_ => syl(r.nextInt(syl.length))).mkString
  }

  /** `min..max` words separated by single spaces (free-text message). */
  def words(min: Int, max: Int): Gen = { r =>
    val n = min + r.nextInt(max - min + 1)
    (0 until n).map(_ => word(r)).mkString(" ")
  }

  val ipv4: Gen = r => s"${r.nextInt(256)}.${r.nextInt(256)}.${r.nextInt(256)}.${r.nextInt(256)}"

  def int(lo: Long, hi: Long): Gen = r => (lo + math.abs(r.nextLong()) % (hi - lo + 1)).toString

  /** Fixed-width zero-padded integer. */
  def intW(digits: Int): Gen = { r =>
    val max = math.pow(10, digits).toLong
    ("%0" + digits + "d").format(math.abs(r.nextLong()) % max)
  }

  def hex(n: Int): Gen = r => (0 until n).map(_ => "0123456789abcdef" (r.nextInt(16))).mkString

  val float2: Gen = r => f"${r.nextDouble() * 1000}%.2f"

  val date: Gen = r => f"${2014 + r.nextInt(4)}%04d-${1 + r.nextInt(12)}%02d-${1 + r.nextInt(28)}%02d"

  val time: Gen = r => f"${r.nextInt(24)}%02d:${r.nextInt(60)}%02d:${r.nextInt(60)}%02d"

  val month3: Gen = {
    val m = Array("Jan", "Feb", "Mar", "Apr", "May", "Jun",
      "Jul", "Aug", "Sep", "Oct", "Nov", "Dec")
    r => m(r.nextInt(12))
  }

  val day2: Gen = r => f"${1 + r.nextInt(28)}%02d"

  val level: Gen = {
    val l = Array("INFO", "WARN", "ERROR", "DEBUG", "TRACE")
    r => l(r.nextInt(5))
  }

  val httpMethod: Gen = {
    val m = Array("GET", "POST", "PUT", "DELETE", "HEAD")
    r => m(r.nextInt(5))
  }

  val hostname: Gen = r => s"${word(r)}${r.nextInt(100)}"

  /** URL path: contains '/' (and sometimes '.') inside one semantic field —
    * a special character living in field content.
    */
  val path: Gen = { r =>
    val segs = 1 + r.nextInt(3)
    "/" + (0 until segs).map(_ => word(r)).mkString("/") +
      (if (r.nextBoolean()) ".html" else "")
  }

  /** UUID-ish id: '-' inside a field, with a VARIABLE number of groups —
    * the tokenization hazard of Assumption 5 (a fixed lexer splits it
    * inconsistently across lines).
    */
  val dashedId: Gen = { r =>
    val groups = 2 + r.nextInt(3)
    (0 until groups).map(_ => hex(4)(r)).mkString("-")
  }

  /** CSV text field in quotes, sometimes containing commas — the §3.2
    * example where Assumption 2 is seemingly violated but the array form
    * `"(F,)*F"` absorbs it.
    */
  val quotedCsv: Gen = { r =>
    val n = 1 + r.nextInt(3)
    (0 until n).map(_ => word(r)).mkString(",")
  }

  def choice(opts: String*): Gen = r => opts(r.nextInt(opts.length))
}
