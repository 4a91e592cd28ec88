package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal property-runner over ScalaCheck generators (the scalatest↔
  * scalacheck bridge artifact is not in the offline cache).
  */
trait PropHelpers {
  def forAllN[T](gen: Gen[T], n: Int = 100, seed: Long = 42)(body: T => Unit): Unit = {
    val params = Gen.Parameters.default
    var s = Seed(seed)
    var i = 0
    while (i < n) {
      gen.apply(params, s).foreach(body)
      s = s.next
      i += 1
    }
  }
}
