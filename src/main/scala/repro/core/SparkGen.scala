package repro.core

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._

/** Distributed version of the generation step's hash-table coverage count
  * (paper §4.1 step 5): each partition enumerates candidate records over its
  * lines (plus an (L-1)-line overlap tail), reduces each to its minimal
  * structure template, and the per-template coverage is aggregated with a
  * map-side-combined reduceByKey — the hash-table, distributed.
  *
  * DATAMARAN's search only ever runs this on bounded samples (S_data), but
  * the distributed scan lets the coverage of candidate templates be verified
  * against the *full* dataset, and demonstrates the per-partition
  * field/record-boundary inference dataflow.
  */
object SparkGen {

  /** Per-template coverage statistics over the full distributed dataset.
    *
    * @param charsets one RT-CharSet per requested enumeration; the output
    *                 `charset_id` column indexes into this sequence
    */
  def templateCoverage(
      spark: SparkSession,
      lines: RDD[String],
      charsets: Seq[Set[Char]],
      maxSpan: Int
  ): DataFrame = {
    val sc = spark.sparkContext
    val bcCs = sc.broadcast(charsets.map(_.toArray).toArray)

    val idxed = lines.zipWithIndex().map { case (l, i) => (i, l) }
    val heads = idxed
      .mapPartitionsWithIndex { (pid, it) =>
        Iterator.single(pid -> it.take(maxSpan - 1).map(_._2).toArray)
      }
      .collect()
      .toMap
    val nParts = idxed.getNumPartitions
    def tailFor(pid: Int): Array[String] = {
      val out = Array.newBuilder[String]
      var need = maxSpan - 1
      var p = pid + 1
      while (need > 0 && p < nParts) {
        val h = heads.getOrElse(p, Array.empty[String])
        val take = math.min(need, h.length)
        out ++= h.take(take); need -= take; p += 1
      }
      out.result()
    }
    val bcTails = sc.broadcast((0 until nParts).map(p => p -> tailFor(p)).toMap)

    val counted: RDD[((Int, String), (Long, Long, Long))] = idxed
      .mapPartitionsWithIndex { (pid, it) =>
        val csArr = bcCs.value.map(_.toSet)
        val buf = it.toArray
        if (buf.isEmpty) Iterator.empty
        else {
          val tail = bcTails.value.getOrElse(pid, Array.empty[String])
          val window = buf.map(_._2) ++ tail
          val nOwn = buf.length
          buf.indices.iterator.flatMap { i =>
            (1 to math.min(maxSpan, window.length - i)).iterator.flatMap { span =>
              val text = Matcher.joinLines(window, i, span)
              if (text.length > 8192) Iterator.empty
              else
                csArr.indices.iterator.flatMap { ci =>
                  TemplateOps.minimalTemplate(text, csArr(ci)).map { t =>
                    val nf = text.length - TemplateOps.fieldCharCount(text, csArr(ci))
                    ((ci, t.canonical), (text.length.toLong, nf.toLong, 1L))
                  }
                }
            }
          }
        }
      }
      .reduceByKey((u: (Long, Long, Long), v: (Long, Long, Long)) =>
        (u._1 + v._1, u._2 + v._2, u._3 + v._3)
      )

    val schema = StructType(Seq(
      StructField("charset_id", IntegerType, nullable = false),
      StructField("template", StringType, nullable = false),
      StructField("coverage", LongType, nullable = false),
      StructField("non_field_coverage", LongType, nullable = false),
      StructField("count", LongType, nullable = false)
    ))
    val rows = counted.map { case ((ci, canon), (cov, nf, cnt)) =>
      Row(ci, canon, cov, nf, cnt)
    }
    spark.createDataFrame(rows, schema)
  }
}
