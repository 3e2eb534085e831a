package repro.exp

import org.scalatest.funsuite.AnyFunSuite
import repro.loggen._

/** Experiment-runner plumbing (cheap parts; full runs live in bench/). */
class ExperimentsSpec extends AnyFunSuite {

  private def outcome(label: Label, e: Boolean, g: Boolean, r: Boolean) =
    Experiments.DatasetOutcome("x", label, e, g, r, 1, 1000, 1, 1, -1, Nil, Nil)

  test("byCategory excludes NS and appends the overall row") {
    val outcomes = Vector(
      outcome(Label.SNI, e = true, g = true, r = true),
      outcome(Label.SNI, e = true, g = false, r = false),
      outcome(Label.MI, e = false, g = false, r = false),
      outcome(Label.NS, e = false, g = false, r = false)
    )
    val cats = Experiments.byCategory(outcomes)
    assert(cats.last.category == "overall")
    assert(cats.last.n == 3)
    assert(math.abs(cats.last.dmExhaustive - 200.0 / 3) < 1e-9)
    val sni = cats.find(_.category == Label.SNI.show).get
    assert(sni.dmExhaustive == 100.0 && sni.dmGreedy == 50.0 && sni.rb == 50.0)
  }

  test("defaults use the paper's alpha, L, M") {
    val p = Experiments.defaults(true)
    assert(p.alpha == 0.10 && p.maxSpan == 10 && p.topM == 50)
    assert(p.exhaustive)
    assert(!Experiments.defaults(false).exhaustive)
  }

  test("optimalTemplate is matched by inference with a large M") {
    val spec = DatasetSpec("opt", Label.SNI,
      Vector(Corpus.csvType(new scala.util.Random(1), 4) -> 1.0), 200, NoiseSpec.none, 3)
    val gt = LogSynth.generate(spec)
    val ref = Experiments.optimalTemplate(gt, 0.10, 10)
    assert(ref.isDefined)
    // M=50 may legitimately miss the optimum (that gap IS Fig 16's metric);
    // with a large M the pools coincide and inference must return it
    val inf = repro.core.Datamaran.infer(
      gt.lines, Experiments.defaults(true).copy(topM = 100000))
    assert(inf.types.head.template.canonical == ref.get,
      s"inferred=${inf.types.head.template.pretty} " +
        s"reference=${repro.core.Template.decode(ref.get).pretty}")
  }

  test("optimalTemplate is None on pure noise") {
    val spec = DatasetSpec("ns", Label.NS, Vector.empty, 250, NoiseSpec(1.0, NoiseSpec.messy), 4)
    val gt = LogSynth.generate(spec)
    // either no candidate at all, or none beating the noise baseline is
    // irrelevant here: the reference only requires >= alpha coverage
    val inf = repro.core.Datamaran.infer(gt.lines, Experiments.defaults(true))
    assert(inf.types.isEmpty)
  }

  test("Tables.render aligns columns") {
    val s = Tables.render("t", Vector("a", "bb"), Vector(Vector("xxx", "y")))
    val lines = s.split('\n')
    assert(lines(1).length == lines(3).length)
    assert(lines(0) == "== t ==")
  }

  test("judgeDatamaran and judgeRecordBreaker run end to end on one dataset") {
    val spec = DatasetSpec("j", Label.SNI,
      Vector(Corpus.pipeType(new scala.util.Random(2)) -> 1.0), 150, NoiseSpec.none, 5)
    val gt = LogSynth.generate(spec)
    val (jd, inf, t) = Experiments.judgeDatamaran(gt, Experiments.defaults(true))
    assert(jd.success, jd.reasons)
    assert(inf.types.length == 1)
    assert(t.totalMs >= 0)
    assert(Experiments.judgeRecordBreaker(gt).success)
  }
}
