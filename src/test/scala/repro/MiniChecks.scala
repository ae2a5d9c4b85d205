package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-check harness over ScalaCheck Gens.
  *
  * The offline image has scalacheck but not the scalatestplus bridge, so
  * suites mix this in instead: `forAllN(gen)(f)` evaluates `f` on `n`
  * deterministically-seeded samples (seeds 0 … n−1), so failures are
  * reproducible run to run.
  */
trait MiniChecks {
  def forAllN[A](gen: Gen[A], n: Int = 60)(f: A => Unit): Unit = {
    val params = Gen.Parameters.default
    var i = 0
    while (i < n) {
      val a =
        try gen.pureApply(params, Seed(i.toLong), retries = 500)
        catch { case _: Gen.RetrievalError => null.asInstanceOf[A] }
      if (a != null) {
        try f(a)
        catch {
          case e: Throwable =>
            throw new AssertionError(s"property failed on sample #$i: $a", e)
        }
      }
      i += 1
    }
  }

  def forAllN2[A, B](ga: Gen[A], gb: Gen[B], n: Int = 60)(f: (A, B) => Unit): Unit =
    forAllN(Gen.zip(ga, gb), n) { case (a, b) => f(a, b) }

  def forAllN3[A, B, C](ga: Gen[A], gb: Gen[B], gc: Gen[C], n: Int = 60)(f: (A, B, C) => Unit): Unit =
    forAllN(Gen.zip(ga, gb, gc), n) { case (a, b, c) => f(a, b, c) }
}
