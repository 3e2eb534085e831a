package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core._

/** spark-submit entrypoint: extract structure from a log file.
  *
  * Usage: ExtractJob <input.log> <outputDir> [greedy|exhaustive]
  *
  * Infers the structure on a driver-side sample (paper §9.1 sampling), then
  * runs the distributed two-phase extraction and writes one CSV directory
  * per relational table plus a `records` table of boundaries.
  */
object ExtractJob {
  def main(args: Array[String]): Unit = {
    require(args.length >= 2, "usage: ExtractJob <input.log> <outputDir> [greedy|exhaustive]")
    val input = args(0)
    val outDir = args(1)
    val exhaustive = args.length < 3 || args(2) != "greedy"
    val spark = SparkSession.builder
      .appName("datamaran-extract")
      .config("spark.sql.shuffle.partitions", 64)
      .getOrCreate()
    try {
      val lines = spark.sparkContext.textFile(input)
      val (inf, ex) = SparkExtract.inferAndExtract(
        spark, lines, DmParams(exhaustive = exhaustive))
      println(s"[ExtractJob] inferred ${inf.types.length} record type(s):")
      inf.types.zipWithIndex.foreach { case (t, i) =>
        println(f"  type $i: score=${t.mdlScore}%.0f cov=${t.sampleCoverage}%.2f  ${t.template.pretty}")
      }
      ex.records.write.mode("overwrite").option("header", true).csv(s"$outDir/records")
      ex.tables.foreach { t =>
        val name = if (t.path.isEmpty) "root" else t.path.replace('.', '_')
        t.df.write.mode("overwrite").option("header", true)
          .csv(s"$outDir/type${t.typeIdx}_$name")
      }
      println(s"[ExtractJob] wrote ${ex.tables.length} tables to $outDir")
    } finally spark.stop()
  }
}
