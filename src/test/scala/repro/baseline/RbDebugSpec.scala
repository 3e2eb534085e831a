package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.loggen._
import repro.exp.Experiments

class RbDebugSpec extends AnyFunSuite {
  test("debug RB failures on clean S(NI)") {
    for (spec <- Corpus.github100.filter(s => s.label == Label.SNI)) {
      val gt = LogSynth.generate(spec)
      if (gt.noiseLineIdxs.isEmpty) {
        val j = Experiments.judgeRecordBreaker(gt)
        if (!j.success)
          println(s"${spec.id} type=${spec.types.head._1.name}: ${j.reasons.headOption.getOrElse("")}".take(220))
      }
    }
    println("done")
  }
}
