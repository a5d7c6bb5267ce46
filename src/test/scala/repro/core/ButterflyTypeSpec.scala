package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Pins the type semantics of Figure 1 / Figure 4 / the conversion rule. */
class ButterflyTypeSpec extends AnyFunSuite {

  // Canonical single-type wedge pairs read from the U layer (layer = 0).
  // Wedge legs are (start-leg, end-leg) raw timestamps.
  val canon: Seq[(String, (Long, Long, Long, Long), Int)] = Seq(
    ("T0: same dir, non-overlap", (1L, 2L, 3L, 4L), 0),
    ("T1: same dir, intersect",   (1L, 3L, 2L, 4L), 1),
    ("T2: same dir, cover",       (1L, 4L, 2L, 3L), 2),
    ("T3: diff dir, non-overlap", (1L, 2L, 4L, 3L), 3),
    ("T4: diff dir, intersect",   (1L, 3L, 4L, 2L), 4),
    ("T5: diff dir, cover",       (1L, 4L, 3L, 2L), 5),
  )

  for ((name, (s1, a1, s2, a2), expected) <- canon) {
    test(s"classify $name") {
      assert(ButterflyType.classify(s1, a1, s2, a2, 0) == expected)
    }
    test(s"conversion rule pairs $name with its xor partner from layer L") {
      assert(ButterflyType.classify(s1, a1, s2, a2, 1) == (expected ^ 1))
    }
    test(s"wedge swap invariance for $name") {
      assert(ButterflyType.classify(s2, a2, s1, a1, 0) == expected)
    }
    test(s"start/end reversal invariance for $name") {
      // reversing the start- and end-vertex swaps both wedges' legs
      assert(ButterflyType.classify(a1, s1, a2, s2, 0) == expected)
    }
    test(s"time reversal invariance for $name") {
      assert(ButterflyType.classify(-s1, -a1, -s2, -a2, 0) == expected)
    }
  }

  test("isValid rejects duplicate timestamps in every position") {
    assert(!ButterflyType.isValid(1, 1, 2, 3, 100))
    assert(!ButterflyType.isValid(1, 2, 1, 3, 100))
    assert(!ButterflyType.isValid(1, 2, 3, 1, 100))
    assert(!ButterflyType.isValid(1, 2, 2, 3, 100))
    assert(!ButterflyType.isValid(1, 2, 3, 2, 100))
    assert(!ButterflyType.isValid(1, 2, 3, 3, 100))
  }

  test("isValid enforces the duration constraint inclusively") {
    assert(ButterflyType.isValid(1, 2, 3, 11, 10))
    assert(!ButterflyType.isValid(1, 2, 3, 12, 10))
    assert(ButterflyType.isValid(11, 2, 3, 1, 10))
  }

  /** Draw four pairwise-distinct timestamps. */
  private def distinct4(rnd: Random): (Long, Long, Long, Long) = {
    val s = rnd.shuffle((-1000L to 1000L).toVector).take(4)
    (s(0), s(1), s(2), s(3))
  }

  test("property: classify is total over distinct stamps and in [0, 6)") {
    val rnd = new Random(1)
    for (_ <- 1 to 500) {
      val (s1, a1, s2, a2) = distinct4(rnd)
      val t = ButterflyType.classify(s1, a1, s2, a2, 0)
      assert(t >= 0 && t < 6)
    }
  }

  test("property: wedge order never changes the type") {
    val rnd = new Random(2)
    for (_ <- 1 to 500) {
      val (s1, a1, s2, a2) = distinct4(rnd)
      assert(ButterflyType.classify(s1, a1, s2, a2, 0) ==
        ButterflyType.classify(s2, a2, s1, a1, 0))
    }
  }

  test("property: layers always differ by the xor pairing") {
    val rnd = new Random(3)
    for (_ <- 1 to 500) {
      val (s1, a1, s2, a2) = distinct4(rnd)
      assert((ButterflyType.classify(s1, a1, s2, a2, 0) ^
        ButterflyType.classify(s1, a1, s2, a2, 1)) == 1)
    }
  }

  test("property: global time shift never changes the type") {
    val rnd = new Random(4)
    for (_ <- 1 to 500) {
      val (s1, a1, s2, a2) = distinct4(rnd)
      val sh = rnd.nextInt(20000) - 10000
      assert(ButterflyType.classify(s1 + sh, a1 + sh, s2 + sh, a2 + sh, 0) ==
        ButterflyType.classify(s1, a1, s2, a2, 0))
    }
  }

  test("property: time reversal never changes the type") {
    val rnd = new Random(5)
    for (_ <- 1 to 500) {
      val (s1, a1, s2, a2) = distinct4(rnd)
      assert(ButterflyType.classify(-s1, -a1, -s2, -a2, 0) ==
        ButterflyType.classify(s1, a1, s2, a2, 0))
    }
  }

  test("property: all six types reachable from random stamps") {
    val rnd = new Random(6)
    val seen = Array.fill(6)(false)
    for (_ <- 1 to 2000) {
      val (s1, a1, s2, a2) = distinct4(rnd)
      seen(ButterflyType.classify(s1, a1, s2, a2, 0)) = true
    }
    assert(seen.forall(identity))
  }
}
