package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-check driver over ScalaCheck generators —
  * the scalatest/scalacheck bridge artifact is not available offline, so we
  * sample generators directly with a fixed seed.
  */
trait PropHelper {
  def forAllN[A](gen: Gen[A], n: Int = 100, seed0: Long = 42L)(f: A => Unit): Unit = {
    val params = Gen.Parameters.default
    var seed   = Seed(seed0)
    var i      = 0
    var tried  = 0
    while (i < n && tried < n * 20) {
      gen.apply(params, seed) match {
        case Some(a) =>
          try f(a)
          catch {
            case e: Throwable =>
              throw new AssertionError(s"property failed on sample #$i: $a", e)
          }
          i += 1
        case None => ()
      }
      seed = seed.next
      tried += 1
    }
    require(i > 0, "generator never produced a value")
  }

  def forAllN2[A, B](ga: Gen[A], gb: Gen[B], n: Int = 100)(f: (A, B) => Unit): Unit =
    forAllN(Gen.zip(ga, gb), n) { case (a, b) => f(a, b) }
}
