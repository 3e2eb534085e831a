package repro.bench

import repro.SparkSpec
import repro.exp.{Experiments, Tables}

/** Reproduces Fig 14a + §5.2.2 prose: running time vs dataset size, greedy
  * vs exhaustive search, local vs distributed (Spark) extraction. The
  * paper's claim to verify: the three search steps are size-independent
  * once sampling kicks in, and total time is dominated by the (eminently
  * parallelizable) extraction for large datasets.
  */
class RuntimeVsSizeBench extends SparkSpec {

  test("Fig 14a: running time vs dataset size") {
    val rows = Experiments.runtimeVsSize(Vector(1.0, 2.0, 4.0, 8.0), spark)
    println(Tables.render(
      "Fig 14a: running time vs size (paper: avg 17s greedy / 37s exhaustive on <50MB; extraction dominates large)",
      Vector("size(MB)", "greedy search", "exhaustive search", "local extract", "spark extract"),
      rows.map(r => Vector(f"${r.sizeMB}%.1f", Tables.ms(r.greedySearchMs),
        Tables.ms(r.exhaustiveSearchMs), Tables.ms(r.localExtractMs), Tables.ms(r.sparkExtractMs)))))

    // search time is bounded by the sample, so it must NOT scale with size
    val s1 = rows.head.exhaustiveSearchMs.toDouble
    val s8 = rows.last.exhaustiveSearchMs.toDouble
    assert(s8 <= s1 * 4 + 3000, f"search should be ~size-independent: $s1%.0f -> $s8%.0f")
    // extraction scales with size: at 8MB it must dominate the search
    assert(rows.last.localExtractMs + rows.last.sparkExtractMs > 0)
    val extract8 = rows.last.localExtractMs.toDouble
    val extract1 = rows.head.localExtractMs.toDouble
    assert(extract8 >= extract1 * 3, f"extraction should scale: $extract1%.0f -> $extract8%.0f")
  }
}
