package repro.loggen

import scala.util.Random
import FieldGen._

/** The two evaluation corpora (DESIGN.md §2):
  *
  *  - [[manual25]] mirrors the shape of paper Table 5 (Fisher's 15 small
  *    single-line-ish datasets + 10 larger / multi-line / interleaved ones);
  *  - [[github100]] mirrors the paper's GitHub crawl with the exact category
  *    mix of Figure 17a — 44 S(NI), 14 S(I), 13 M(NI), 18 M(I), 11 NS — and
  *    embeds the paper's documented failure causes (§9.4): records longer
  *    than L lines, and interleaved types that collapse into one generic
  *    word-array template.
  *
  * Everything is deterministic in the dataset seed.
  */
object Corpus {

  // ---------------------------------------------------------------- types

  /** Apache-style web server log line. */
  def apacheType(r: Random): RecordTypeSpec = RecordTypeSpec("apache", Vector(Vector(
    Target("ip", Vector(Fld(ipv4))),
    Lit(" - - ["),
    Target("ts", Vector(Fld(date), Lit(" "), Fld(time))),
    Lit("] \""),
    Fld(httpMethod), Lit(" "),
    Target("url", Vector(Fld(path))),
    Lit(" HTTP/1.1\" "),
    Target("status", Vector(Fld(int(200, 599)))),
    Lit(" "), Fld(int(100, 99999))
  )))

  /** Syslog-style line with a free-text tail (the §4.3.1 partial-unfolding
    * shape: regular fields mixed with text).
    */
  def syslogType(r: Random): RecordTypeSpec = {
    val prog = choice("snort", "crond", "sshd", "yumd", "ntpd")
    RecordTypeSpec("syslog", Vector(Vector(
      Target("ts", Vector(Fld(month3), Lit(" "), Fld(day2), Lit(" "), Fld(time))),
      Lit(" "),
      Target("host", Vector(Fld(hostname))),
      Lit(" "), Fld(prog), Lit(": "),
      Target("msg", Vector(Fld(words(2, 6))))
    )))
  }

  /** Plain CSV with typed columns. */
  def csvType(r: Random, nCols: Int): RecordTypeSpec = {
    val cols: Vector[Part] = (0 until nCols).toVector.flatMap { c =>
      val f: Part = c % 3 match {
        case 0 => Target(s"c$c", Vector(Fld(int(0, 99999))))
        case 1 => Target(s"c$c", Vector(Fld(word)))
        case _ => Fld(float2)
      }
      if (c == nCols - 1) Vector(f) else Vector(f, Lit(","))
    }
    RecordTypeSpec(s"csv$nCols", Vector(cols))
  }

  /** CSV with a quoted field that sometimes contains commas (§3.2). */
  def csvQuotedType(r: Random): RecordTypeSpec = RecordTypeSpec("csvq", Vector(Vector(
    Target("id", Vector(Fld(int(1, 99999)))), Lit(","),
    Lit("\""), Target("tags", Vector(Fld(quotedCsv))), Lit("\""), Lit(","),
    Target("who", Vector(Fld(word))), Lit(","), Fld(float2)
  )))

  /** key=value application log. */
  def kvType(r: Random): RecordTypeSpec = RecordTypeSpec("kv", Vector(Vector(
    Lit("ts="), Target("ts", Vector(Fld(date), Lit("T"), Fld(time))),
    Lit(" user="), Target("user", Vector(Fld(word))),
    Lit(" action="), Fld(choice("login", "logout", "purchase", "view", "edit")),
    Lit(" dur="), Target("dur", Vector(Fld(int(1, 10000))))
  )))

  /** Pipe-delimited transaction record. */
  def pipeType(r: Random): RecordTypeSpec = RecordTypeSpec("pipe", Vector(Vector(
    Target("txid", Vector(Fld(int(100000, 999999)))), Lit("|"),
    Target("who", Vector(Fld(word))), Lit("|"),
    Fld(float2), Lit("|"),
    Target("when", Vector(Fld(date)))
  )))

  /** Tokenization-hazard line: a dashed id with a VARIABLE number of groups
    * inside one semantic field (breaks Assumption 5 baselines).
    */
  def dashedType(r: Random): RecordTypeSpec = RecordTypeSpec("dashed", Vector(Vector(
    Target("ts", Vector(Fld(date), Lit(" "), Fld(time))),
    Lit(" "), Fld(level), Lit(" req "),
    Target("reqid", Vector(Fld(dashedId))),
    Lit(" from "),
    Target("ip", Vector(Fld(ipv4)))
  )))

  /** ls -l style fixed-column line (permissions without '-' so the format
    * is tokenization-stable — the dashed variant is a separate hazard type).
    */
  def lsType(r: Random): RecordTypeSpec = RecordTypeSpec("ls", Vector(Vector(
    Fld(choice("rwxrwxrwx", "rwxrxrx", "rwrr")), Lit(" "),
    Fld(int(1, 20)), Lit(" "),
    Target("owner", Vector(Fld(word))), Lit(" "),
    Fld(word), Lit(" "),
    Target("size", Vector(Fld(int(0, 9999999)))), Lit(" "),
    Fld(month3), Lit(" "), Fld(day2), Lit(" "), Fld(time), Lit(" "),
    Target("name", Vector(Fld(word), Lit("."), Fld(choice("txt", "log", "dat", "gz"))))
  )))

  /** Single-line XML row (stackexchange-dump style). */
  def xmlRowType(r: Random): RecordTypeSpec = RecordTypeSpec("xmlrow", Vector(Vector(
    Lit("  <row Id=\""), Target("id", Vector(Fld(int(1, 9999999)))),
    Lit("\" CreationDate=\""), Target("created", Vector(Fld(date))),
    Lit("\" Score=\""), Fld(int(0, 500)),
    Lit("\" Title=\""), Target("title", Vector(Fld(words(2, 7)))),
    Lit("\" />")
  )))

  /** VCF-like tab-separated genomics line. */
  def vcfType(r: Random): RecordTypeSpec = RecordTypeSpec("vcf", Vector(Vector(
    Target("chrom", Vector(Fld(choice("chr1", "chr2", "chr3", "chrX")))), Lit("\t"),
    Target("pos", Vector(Fld(int(1, 248000000)))), Lit("\t"),
    Fld(hex(8)), Lit("\t"),
    Fld(choice("A", "C", "G", "T")), Lit("\t"),
    Fld(choice("A", "C", "G", "T")), Lit("\t"),
    Fld(float2)
  )))

  /** FASTQ-like 4-line record. */
  def fastqType(r: Random): RecordTypeSpec = {
    val bases: Gen = rr => (0 until 20 + rr.nextInt(30)).map(_ => "ACGT"(rr.nextInt(4))).mkString
    val quals: Gen = rr => (0 until 20 + rr.nextInt(30)).map(_ => "ABCDEFGHIJ"(rr.nextInt(10))).mkString
    RecordTypeSpec("fastq", Vector(
      Vector(Lit("@read_"), Target("rid", Vector(Fld(hex(8)))), Lit(" length="), Fld(int(20, 50))),
      Vector(Target("seq", Vector(Fld(bases)))),
      Vector(Lit("+")),
      Vector(Fld(quals))
    ))
  }

  /** JSON-ish fixed-span multi-line record (thailand-district style). */
  def jsonType(r: Random, extraFields: Int = 0): RecordTypeSpec = {
    val mid = (0 until extraFields).toVector.map { i =>
      Vector[Part](Lit(s"  \"k$i\": \""), Fld(word), Lit("\","))
    }
    RecordTypeSpec("json", Vector(
      Vector(Lit("{")),
      Vector(Lit("  \"id\": "), Target("id", Vector(Fld(int(1, 99999)))), Lit(",")),
      Vector(Lit("  \"name\": \""), Target("name", Vector(Fld(word))), Lit("\",")),
    ) ++ mid ++ Vector(
      Vector(Lit("  \"zip\": "), Target("zip", Vector(Fld(intW(5))))),
      Vector(Lit("}"))
    ))
  }

  /** Generic multi-line log record with a configurable span. */
  def multiType(r: Random, span: Int, name: String = "multi"): RecordTypeSpec = {
    require(span >= 2)
    val head = Vector[Part](
      Lit("["), Target("ts", Vector(Fld(date), Lit(" "), Fld(time))), Lit("] "),
      Fld(level), Lit(" event="), Target("ev", Vector(Fld(word))),
      Lit(" id="), Target("id", Vector(Fld(int(1, 999999))))
    )
    val tail = Vector[Part](
      Lit("    done rc="), Target("rc", Vector(Fld(int(0, 16)))),
      Lit(" elapsed="), Fld(float2), Lit("ms")
    )
    val mids = (0 until span - 2).toVector.map { i =>
      val tag = s"m$i"
      Vector[Part](
        Lit(s"    $tag: "),
        (if (i == 0) Target("host", Vector(Fld(hostname), Lit(":"), Fld(int(1024, 65535))))
         else Fld(words(1, 4))): Part
      )
    }
    RecordTypeSpec(name + span, Vector(head) ++ mids ++ Vector(tail))
  }

  /** Crash-log style: header + fixed detail lines, span 3. */
  def crashType(r: Random): RecordTypeSpec = RecordTypeSpec("crash", Vector(
    Vector(Lit("Process "), Target("proc", Vector(Fld(word))), Lit(" crashed at "),
      Target("ts", Vector(Fld(date), Lit(" "), Fld(time)))),
    Vector(Lit("  signal: "), Target("sig", Vector(Fld(choice("SIGSEGV", "SIGABRT", "SIGBUS")))),
      Lit(" code="), Fld(int(0, 255))),
    Vector(Lit("  frame: 0x"), Fld(hex(8)), Lit(" in "), Fld(word))
  ))

  /** Word-array twins: two "types" that both reduce to (F )*F\n — the
    * paper's §9.4 interleaved-greedy failure cause.
    */
  def wordsShort(r: Random): RecordTypeSpec =
    RecordTypeSpec("wshort", Vector(Vector(Target("msg", Vector(Fld(words(3, 5)))))))
  def wordsLong(r: Random): RecordTypeSpec =
    RecordTypeSpec("wlong", Vector(Vector(Target("msg", Vector(Fld(words(7, 10)))))))

  /** Free-text lines: structured-looking to nothing but (F )*F\n — an NS
    * probe that must be rejected by the MDL noise baseline.
    */
  def freeTextType(r: Random): RecordTypeSpec =
    RecordTypeSpec("freetext", Vector(Vector(Fld(words(4, 12)))))

  // ------------------------------------------------------------ manual 25

  /** Analogs of the paper's 25 manually collected datasets (Table 5).
    * Name / approximate scale / #types / max span mirror the table; large
    * files are scaled down (see DESIGN.md §2 and EXPERIMENTS.md).
    */
  def manual25: Vector[DatasetSpec] = {
    val r = new Random(20180610L)
    def spec(id: String, label: Label, types: Vector[(RecordTypeSpec, Double)],
             nBlocks: Int, noise: NoiseSpec, seed: Long) =
      DatasetSpec(id, label, types, nBlocks, noise, seed)
    Vector(
      spec("transaction", Label.SNI, Vector(pipeType(r) -> 1.0), 900, NoiseSpec.none, 101),
      spec("comma-sep", Label.SNI, Vector(csvType(r, 6) -> 1.0), 300, NoiseSpec.none, 102),
      spec("webserver", Label.SNI, Vector(apacheType(r) -> 1.0), 2500, NoiseSpec.none, 103),
      spec("mac-asl", Label.SNI, Vector(dashedType(r) -> 1.0), 1400, NoiseSpec.some(0.03), 104),
      spec("boot-log", Label.SNI, Vector(syslogType(r) -> 1.0), 260, NoiseSpec.none, 105),
      spec("crash-log", Label.MNI, Vector(crashType(r) -> 1.0), 220, NoiseSpec.some(0.05), 106),
      spec("crash-log-mod", Label.MNI, Vector(crashType(r) -> 1.0), 220, NoiseSpec.none, 107),
      spec("ls-l", Label.SNI, Vector(lsType(r) -> 1.0), 150, NoiseSpec.none, 108),
      spec("netstat", Label.SI, Vector(csvType(r, 4) -> 1.0, kvType(r) -> 0.6), 160, NoiseSpec.none, 109),
      spec("printer", Label.SNI, Vector(syslogType(r) -> 1.0), 240, NoiseSpec.some(0.04), 110),
      spec("income", Label.SNI, Vector(csvType(r, 9) -> 1.0), 140, NoiseSpec.none, 111),
      spec("railroad", Label.SNI, Vector(csvType(r, 5) -> 1.0), 130, NoiseSpec.none, 112),
      spec("app-log", Label.SNI, Vector(kvType(r) -> 1.0), 700, NoiseSpec.none, 113),
      spec("loginwindow", Label.SNI, Vector(syslogType(r) -> 1.0), 600, NoiseSpec.some(0.02), 114),
      spec("pkg-install", Label.SNI, Vector(dashedType(r) -> 1.0), 300, NoiseSpec.none, 115),
      // ---- the 10 additional datasets
      spec("thailand-json", Label.MNI, Vector(jsonType(r, 3) -> 1.0), 420, NoiseSpec.none, 116),
      spec("stackexchange-xml", Label.SNI, Vector(xmlRowType(r) -> 1.0), 42000, NoiseSpec.none, 117),
      spec("vcf-genetic", Label.SNI, Vector(vcfType(r) -> 1.0), 160000, NoiseSpec.none, 118),
      spec("fastq-genetic", Label.MNI, Vector(fastqType(r) -> 1.0), 22000, NoiseSpec.none, 119),
      spec("blog-xml", Label.MNI, Vector(jsonType(r, 5) -> 1.0), 280, NoiseSpec.none, 120),
      spec("log-file-1", Label.MI, Vector(multiType(r, 9, "big") -> 1.0, syslogType(r) -> 0.8), 420, NoiseSpec.some(0.05), 121),
      spec("log-file-2", Label.MNI, Vector(multiType(r, 3, "tri") -> 1.0), 520, NoiseSpec.some(0.06), 122),
      spec("log-file-3", Label.SI, Vector(apacheType(r) -> 1.0, kvType(r) -> 0.7), 1400, NoiseSpec.none, 123),
      spec("log-file-4", Label.MI, Vector(multiType(r, 10, "ten") -> 1.0, crashType(r) -> 0.7), 330, NoiseSpec.some(0.04), 124),
      spec("log-file-5", Label.MNI, Vector(fastqType(r) -> 1.0), 600, NoiseSpec.some(0.05), 125)
    )
  }

  // ------------------------------------------------------------ github100

  /** 100 datasets with the category mix of Fig 17a. Categories:
    * 44 S(NI) (indices 0-43), 14 S(I) (44-57), 13 M(NI) (58-70),
    * 18 M(I) (71-88), 11 NS (89-99).
    *
    * Difficulty mix (documented in DESIGN.md): S(NI) — 19/44 noisy and/or
    * Assumption-5 hazards; S(I) — 13/14 noisy; M datasets mostly noisy.
    * Probes for the paper's failure causes: #70 has a 12-line record type
    * (> L = 10); #88 an 11-line type; #57 is the word-array-twin
    * interleaved probe.
    */
  def github100: Vector[DatasetSpec] = {
    val out = Vector.newBuilder[DatasetSpec]
    def rng(i: Int) = new Random(900000L + i)

    // S(NI): 44, of which 19 noisy (i % 7 in {0,1,2}). Composition is
    // calibrated to the ambient property the paper reports (RecordBreaker
    // extracts 56.8% of S(NI)): datasets violating Assumption 5 — fields
    // with variable special-character content (URL paths, dashed ids,
    // quoted csv, permission strings) — are placed on the noisy positions,
    // where RecordBreaker already fails through its total description
    // (catch-all) branch; clean positions carry fixed-tokenization formats.
    for (i <- 0 until 44) {
      val r = rng(i)
      val noisy = i % 7 <= 2
      val t =
        if (noisy) i % 6 match {
          case 0 => apacheType(r)
          case 1 => dashedType(r)
          case 2 => csvQuotedType(r)
          case 3 => xmlRowType(r)
          case 4 => syslogType(r)
          case _ => csvType(r, 4 + (i % 5))
        }
        else i % 5 match {
          case 0 => csvType(r, 4 + (i % 4))
          case 1 => kvType(r)
          case 2 => pipeType(r)
          case 3 => syslogType(r)
          case _ => lsType(r)
        }
      val noise = if (noisy) NoiseSpec.some(0.06 + (i % 5) * 0.02) else NoiseSpec.none
      out += DatasetSpec(f"gh-sni-$i%02d", Label.SNI, Vector(t -> 1.0), 700 + 30 * i, noise, 1000L + i)
    }
    // S(I): 14
    for (i <- 0 until 14) {
      val r = rng(100 + i)
      val types: Vector[(RecordTypeSpec, Double)] =
        if (i == 13) Vector(wordsShort(r) -> 1.0, wordsLong(r) -> 0.9) // DM failure probe
        else if (i == 0) Vector(kvType(r) -> 1.0, pipeType(r) -> 0.7) // the one clean, RB-extractable pair
        else {
          val a = i % 4 match {
            case 0 => apacheType(r)
            case 1 => kvType(r)
            case 2 => pipeType(r)
            case _ => csvType(r, 5)
          }
          val b = i % 3 match {
            case 0 => syslogType(r)
            case 1 => dashedType(r)
            case _ => lsType(r)
          }
          Vector(a -> 1.0, b -> 0.7)
        }
      val noise = if (i == 0) NoiseSpec.none else NoiseSpec.some(0.05 + (i % 4) * 0.03)
      out += DatasetSpec(f"gh-si-$i%02d", Label.SI, types, 900 + 40 * i, noise, 2000L + i)
    }
    // M(NI): 13
    for (i <- 0 until 13) {
      val r = rng(200 + i)
      val t = i match {
        case 12 => multiType(r, 12, "long") // > L: DM failure probe
        case _ =>
          i % 4 match {
            case 0 => crashType(r)
            case 1 => jsonType(r, i % 3)
            case 2 => multiType(r, 2 + (i % 6))
            case _ => fastqType(r)
          }
      }
      val noise = if (i % 2 == 0) NoiseSpec.some(0.05 + (i % 3) * 0.03) else NoiseSpec.none
      out += DatasetSpec(f"gh-mni-$i%02d", Label.MNI, Vector(t -> 1.0), 500 + 25 * i, noise, 3000L + i)
    }
    // M(I): 18
    for (i <- 0 until 18) {
      val r = rng(300 + i)
      val types: Vector[(RecordTypeSpec, Double)] =
        if (i == 17) Vector(multiType(r, 11, "xl") -> 1.0, syslogType(r) -> 0.8) // > L probe
        else {
          val a = i % 3 match {
            case 0 => crashType(r)
            case 1 => multiType(r, 3 + (i % 5))
            case _ => jsonType(r, i % 2)
          }
          val b = i % 4 match {
            case 0 => syslogType(r)
            case 1 => apacheType(r)
            case 2 => kvType(r)
            case _ => multiType(r, 2, "two")
          }
          Vector(a -> 1.0, b -> 0.8)
        }
      val noise = if (i % 3 != 1) NoiseSpec.some(0.04 + (i % 4) * 0.03) else NoiseSpec.none
      out += DatasetSpec(f"gh-mi-$i%02d", Label.MI, types, 550 + 25 * i, noise, 4000L + i)
    }
    // NS: 11 (10 messy + 1 free-text)
    for (i <- 0 until 11) {
      val r = rng(400 + i)
      val types: Vector[(RecordTypeSpec, Double)] =
        if (i == 10) Vector(freeTextType(r) -> 1.0) else Vector.empty
      val noise = if (i == 10) NoiseSpec.none else NoiseSpec(1.0, NoiseSpec.messy)
      out += DatasetSpec(f"gh-ns-$i%02d", Label.NS, types, 700, noise, 5000L + i)
    }
    out.result()
  }
}
