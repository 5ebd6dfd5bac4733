package repro.graph

import org.scalatest.funsuite.AnyFunSuite

class HashingSpec extends AnyFunSuite {

  test("mix64 is deterministic") {
    assert(Hashing.mix64(12345L) == Hashing.mix64(12345L))
  }

  test("mix64 of distinct small inputs are distinct") {
    val outs = (0L until 10000L).map(Hashing.mix64).toSet
    assert(outs.size == 10000)
  }

  test("mix64(0) is not 0 (no fixed point at zero)") {
    assert(Hashing.mix64(0L) != 0L)
  }

  test("bucket stays in range for adversarial inputs") {
    val xs = Seq(Long.MinValue, Long.MaxValue, -1L, 0L, 1L, 0x8000000000000000L, 42L)
    for (x <- xs; n <- Seq(1, 2, 3, 7, 64, 1000)) {
      val b = Hashing.bucket(x, n)
      assert(b >= 0 && b < n, s"bucket($x, $n) = $b out of range")
    }
  }

  test("bucket rejects non-positive sizes") {
    intercept[IllegalArgumentException](Hashing.bucket(1L, 0))
    intercept[IllegalArgumentException](Hashing.bucket(1L, -3))
  }

  test("bucket is roughly uniform over 16 buckets") {
    val counts = new Array[Int](16)
    (0L until 160000L).foreach(x => counts(Hashing.bucket(x, 16)) += 1)
    counts.foreach { c => assert(math.abs(c - 10000) < 600, s"skewed bucket: $c") }
  }

  test("bucket salt changes the mapping") {
    val same = (0L until 1000L).count(x => Hashing.bucket(x, 64) == Hashing.bucket(x, 64, salt = 99L))
    assert(same < 100) // ~1/64 expected collisions
  }

  test("seedAt differs across indices") {
    val seeds = (0L until 1000L).map(Hashing.seedAt(42L, _)).toSet
    assert(seeds.size == 1000)
  }

  test("toUnitDouble lands in [0,1) for edge-case bits") {
    for (x <- Seq(Long.MinValue, Long.MaxValue, -1L, 0L, 1L)) {
      val d = Hashing.toUnitDouble(x)
      assert(d >= 0.0 && d < 1.0, s"toUnitDouble($x) = $d")
    }
  }

  test("toUnitDouble mean over mixed stream is near 0.5") {
    val mean = (0L until 100000L).map(i => Hashing.toUnitDouble(Hashing.mix64(i))).sum / 100000.0
    assert(math.abs(mean - 0.5) < 0.01)
  }
}
