package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Deterministic sampling from ScalaCheck generators, usable from plain
  * FunSuite tests (the offline image ships scalacheck but not the
  * scalatestplus bridge).
  */
object PropHelpers {
  def samples[A](g: Gen[A], n: Int, seed: Long = 42L): Seq[A] = {
    var s = Seed(seed)
    val out = Seq.newBuilder[A]
    var count = 0
    var tries = 0
    while (count < n && tries < n * 20) {
      g.apply(Gen.Parameters.default, s) match {
        case Some(a) => out += a; count += 1
        case None    => ()
      }
      s = s.next
      tries += 1
    }
    out.result()
  }
}
