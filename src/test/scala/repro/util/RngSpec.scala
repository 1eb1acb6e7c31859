package repro.util

import org.scalatest.funsuite.AnyFunSuite

class RngSpec extends AnyFunSuite {

  test("SplitMix64 is deterministic for equal seeds") {
    val a = new SplitMix64(42); val b = new SplitMix64(42)
    assert((1 to 100).map(_ => a.nextLong()) == (1 to 100).map(_ => b.nextLong()))
  }

  test("SplitMix64 differs across seeds") {
    val a = new SplitMix64(1); val b = new SplitMix64(2)
    assert((1 to 10).map(_ => a.nextLong()) != (1 to 10).map(_ => b.nextLong()))
  }

  test("nextInt respects bounds") {
    val r = new SplitMix64(7)
    for (_ <- 1 to 10000; bound <- Seq(1, 2, 3, 17, 1000)) {
      val v = r.nextInt(bound)
      assert(v >= 0 && v < bound)
    }
  }

  test("nextInt(1) is always 0") {
    val r = new SplitMix64(3)
    assert((1 to 100).forall(_ => r.nextInt(1) == 0))
  }

  test("nextInt rejects non-positive bounds") {
    val r = new SplitMix64(3)
    intercept[IllegalArgumentException](r.nextInt(0))
    intercept[IllegalArgumentException](r.nextInt(-5))
  }

  test("nextDouble lies in [0, 1)") {
    val r = new SplitMix64(11)
    (1 to 10000).foreach { _ =>
      val d = r.nextDouble()
      assert(d >= 0.0 && d < 1.0)
    }
  }

  test("nextInt is roughly uniform") {
    val r = new SplitMix64(5)
    val counts = new Array[Int](10)
    (1 to 100000).foreach(_ => counts(r.nextInt(10)) += 1)
    counts.foreach(c => assert(math.abs(c - 10000) < 600, s"bucket count $c too far from 10000"))
  }

  test("forVertex streams are independent across vertices") {
    val a = Rng.forVertex(1, 10, 5, Rng.SaltPropagate)
    val b = Rng.forVertex(1, 11, 5, Rng.SaltPropagate)
    assert((1 to 10).map(_ => a.nextLong()) != (1 to 10).map(_ => b.nextLong()))
  }

  test("forVertex streams are independent across iterations") {
    val a = Rng.forVertex(1, 10, 5, Rng.SaltPropagate)
    val b = Rng.forVertex(1, 10, 6, Rng.SaltPropagate)
    assert((1 to 10).map(_ => a.nextLong()) != (1 to 10).map(_ => b.nextLong()))
  }

  test("forVertex streams are independent across salts") {
    val a = Rng.forVertex(1, 10, 5, Rng.SaltPropagate)
    val b = Rng.forVertex(1, 10, 5, Rng.SaltTie)
    assert((1 to 10).map(_ => a.nextLong()) != (1 to 10).map(_ => b.nextLong()))
  }

  test("forVertex is reproducible") {
    val a = Rng.forVertex(9, 3, 2, Rng.SaltSend)
    val b = Rng.forVertex(9, 3, 2, Rng.SaltSend)
    assert((1 to 50).map(_ => a.nextInt(100)) == (1 to 50).map(_ => b.nextInt(100)))
  }

  test("forItem is reproducible and distinct per item") {
    val a1 = Rng.forItem(4, 0, Rng.SaltGen); val a2 = Rng.forItem(4, 0, Rng.SaltGen)
    val b = Rng.forItem(4, 1, Rng.SaltGen)
    val s1 = (1 to 20).map(_ => a1.nextLong())
    assert(s1 == (1 to 20).map(_ => a2.nextLong()))
    assert(s1 != (1 to 20).map(_ => b.nextLong()))
  }
}
