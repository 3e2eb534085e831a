package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}
import repro.loggen._
import scala.collection.mutable

/** Distributed extraction: equivalence with the sequential extractor,
  * relational output correctness, and a DuckDB oracle round-trip.
  */
class SparkExtractSpec extends SparkSpec {

  private val F = TField
  private def c(ch: Char) = TChar(ch)

  private def crashGt(n: Int, noise: Double, seed: Long): GtDataset =
    LogSynth.generate(DatasetSpec("sx", Label.MNI,
      Vector(Corpus.crashType(new scala.util.Random(seed)) -> 1.0), n, NoiseSpec.some(noise), seed))

  private def templatesFor(gt: GtDataset): Vector[Template] =
    Datamaran.infer(gt.lines, DmParams()).types.map(_.template)

  test("spark extraction equals local extraction (multi-line, noise, 7 partitions)") {
    val gt = crashGt(200, 0.08, 21)
    val ts = templatesFor(gt)
    assert(ts.nonEmpty)
    val local = Datamaran.extract(gt.lines, ts, 10)
    val rdd = spark.sparkContext.parallelize(gt.lines, 7)
    val ex = SparkExtract.extract(spark, rdd, ts, 10)
    val got = ex.records.collect().map(r => (r.getInt(0), r.getLong(1), r.getInt(2))).sortBy(_._2)
    val want = local.map(r => (r.typeIdx, r.start.toLong, r.span)).sortBy(_._2)
    assert(got.toVector == want)
  }

  test("records straddling partition boundaries are found") {
    // 3-line records, one partition per ~2 lines: every record straddles
    val gt = crashGt(40, 0.0, 22)
    val ts = templatesFor(gt)
    val local = Datamaran.extract(gt.lines, ts, 10)
    val rdd = spark.sparkContext.parallelize(gt.lines, math.max(2, gt.lines.length / 2))
    val ex = SparkExtract.extract(spark, rdd, ts, 10)
    assert(ex.records.count() == local.length.toLong)
  }

  test("more partitions than lines is handled") {
    val gt = crashGt(5, 0.0, 23)
    val ts = templatesFor(gt)
    val rdd = spark.sparkContext.parallelize(gt.lines, 64)
    val ex = SparkExtract.extract(spark, rdd, ts, 10)
    assert(ex.records.count() == gt.records.length.toLong)
  }

  test("root table rows equal the local relational conversion") {
    val gt = crashGt(120, 0.05, 24)
    val ts = templatesFor(gt)
    val local = Datamaran.extract(gt.lines, ts, 10)
    val rdd = spark.sparkContext.parallelize(gt.lines, 5)
    val ex = SparkExtract.extract(spark, rdd, ts, 10)
    val root = ex.tables.find(t => t.typeIdx == 0 && t.path == "").get.df
    val got = root.collect().map(r => (r.getLong(0), r.toSeq.drop(2).map(_.toString).toVector))
      .sortBy(_._1).toVector
    val want = local.filter(_.typeIdx == 0).map { ri =>
      val rootRow = Relational.toRows(ri.parsed).find(_.path == "").get
      (ri.start.toLong, rootRow.values)
    }.sortBy(_._1)
    assert(got == want)
  }

  test("array child tables carry (record_id, ord) keys") {
    val t = Template(Vector(F, c(' '), TArray(Vector(F), ',', '\n')))
    val lines = Vector("h a,b,c", "h x,y", "junk junk junk?")
    val rdd = spark.sparkContext.parallelize(lines, 2)
    val ex = SparkExtract.extract(spark, rdd, Vector(t), 10)
    val child = ex.tables.find(_.path == "a0").get.df
    val rows = child.collect().map(r => (r.getLong(0), r.getString(1), r.getString(2))).sortBy(x => (x._1, x._2))
    assert(rows.toVector == Vector((0L, "0", "a"), (0L, "1", "b"), (0L, "2", "c"), (1L, "0", "x"), (1L, "1", "y")))
  }

  test("template priority is respected distributed") {
    val t1 = Template(Vector(F, c(','), F, c('\n')))
    val t2 = Template(Vector(TArray(Vector(F), ',', '\n')))
    val lines = Vector("a,b", "a,b,c", "z,w")
    val rdd = spark.sparkContext.parallelize(lines, 2)
    val ex = SparkExtract.extract(spark, rdd, Vector(t1, t2), 10)
    val got = ex.records.collect().map(r => (r.getLong(1), r.getInt(0))).sortBy(_._1).toVector
    assert(got == Vector((0L, 0), (1L, 1), (2L, 0)))
  }

  test("SparkGen.templateCoverage matches local genST for a fixed charset") {
    val gt = crashGt(80, 0.05, 25)
    val p = DmParams(sampleMaxChars = Int.MaxValue)
    val cs = Set(':', ' ', '=')
    // local, without the alpha filter: collect raw bin sums
    val localBins = mutable.HashMap.empty[String, (Long, Long)]
    for (i <- gt.lines.indices; span <- 1 to p.maxSpan if i + span <= gt.lines.length) {
      val text = Matcher.joinLines(gt.lines, i, span)
      TemplateOps.minimalTemplate(text, cs).foreach { t =>
        val cur = localBins.getOrElse(t.canonical, (0L, 0L))
        localBins(t.canonical) = (cur._1 + text.length, cur._2 + 1)
      }
    }
    val rdd = spark.sparkContext.parallelize(gt.lines, 6)
    val df = SparkGen.templateCoverage(spark, rdd, Seq(cs), p.maxSpan)
    val got = df.collect().map(r => r.getString(1) -> (r.getLong(2), r.getLong(4))).toMap
    assert(got.view.mapValues(identity).toMap == localBins.toMap)
  }

  test("oracle round-trip: extracted lineitem log aggregates match DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.002).limit(4000).cache()
    val cols = li.columns
    val logDf = li.select(concat_ws("|", cols.map(col): _*) as "line")
    val lines = logDf.collect().map(_.getString(0)).toVector
    // known template: 10 pipe-separated fields per line
    val items = Vector.tabulate(cols.length)(i =>
      if (i == cols.length - 1) Vector(F, c('\n')) else Vector(F, c('|'))).flatten
    val t = Template(items)
    val rdd = spark.sparkContext.parallelize(lines, 8)
    val ex = SparkExtract.extract(spark, rdd, Vector(t), 10)
    assert(ex.records.count() == lines.length.toLong)
    val root = ex.tables.find(_.path == "").get.df
    val extracted = root.select(
      col("f7") as "l_returnflag",
      col("f3").cast("double") as "qty"
    ).groupBy("l_returnflag").agg(
      count(lit(1)) as "cnt",
      round(sum(col("qty")), 4) as "total_qty"
    )
    Oracle.assertEquivalent(
      extracted,
      """SELECT l_returnflag,
        |       count(*) AS cnt,
        |       round(sum(CAST(l_quantity AS DOUBLE)), 4) AS total_qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li
    )
  }

  test("inferAndExtract finds the single type of an apache log end-to-end") {
    val gt = LogSynth.generate(DatasetSpec("ae", Label.SNI,
      Vector(Corpus.apacheType(new scala.util.Random(31)) -> 1.0), 500, NoiseSpec.some(0.05), 31))
    val rdd = spark.sparkContext.parallelize(gt.lines, 4)
    val (inf, ex) = SparkExtract.inferAndExtract(spark, rdd, DmParams())
    assert(inf.types.length == 1)
    assert(ex.records.count() == gt.records.length.toLong)
  }

  test("records dataframe schema is (type_idx, start_line, span)") {
    val gt = crashGt(20, 0.0, 26)
    val ts = templatesFor(gt)
    val ex = SparkExtract.extract(spark, spark.sparkContext.parallelize(gt.lines, 2), ts, 10)
    assert(ex.records.columns.toVector == Vector("type_idx", "start_line", "span"))
  }
}
