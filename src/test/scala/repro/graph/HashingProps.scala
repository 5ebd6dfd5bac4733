package repro.graph

import org.scalacheck.{Prop, Properties}
import org.scalacheck.Prop.forAll

/** ScalaCheck property suite for the hashing substrate (run by sbt's
  * native ScalaCheck integration alongside the ScalaTest suites).
  */
object HashingProps extends Properties("Hashing") {

  property("bucket in range") = forAll { (x: Long, nRaw: Int) =>
    val n = math.abs(nRaw % 1024) + 1
    val b = Hashing.bucket(x, n)
    b >= 0 && b < n
  }

  property("bucket deterministic") = forAll { (x: Long, salt: Long) =>
    Hashing.bucket(x, 64, salt) == Hashing.bucket(x, 64, salt)
  }

  property("mix64 bijective on samples (no collision)") = forAll { (a: Long, b: Long) =>
    (a == b) == (Hashing.mix64(a) == Hashing.mix64(b))
  }

  property("toUnitDouble in [0,1)") = forAll { (x: Long) =>
    val d = Hashing.toUnitDouble(x)
    d >= 0.0 && d < 1.0
  }

  property("seedAt splits: neighbors differ") = forAll { (seed: Long, i: Long) =>
    Prop(i == Long.MaxValue || Hashing.seedAt(seed, i) != Hashing.seedAt(seed, i + 1))
  }
}
