package repro.util

import org.scalatest.funsuite.AnyFunSuite
import scala.collection.mutable.ArrayBuffer
import scala.util.Random

/** The order-statistic tree must behave exactly like a sorted multiset. */
class OrderStatTreeSpec extends AnyFunSuite {

  test("empty tree basics") {
    val t = new OrderStatTree
    assert(t.isEmpty && !t.nonEmpty && t.size == 0)
    assert(t.countLess(5) == 0 && t.countGreater(5) == 0)
    assert(!t.erase(1))
    intercept[IllegalArgumentException](t.maxKey)
  }

  test("single element") {
    val t = new OrderStatTree
    t.insert(7)
    assert(t.size == 1 && t.maxKey == 7 && t.contains(7))
    assert(t.countLess(7) == 0 && t.countLessOrEqual(7) == 1)
    assert(t.countGreater(7) == 0 && t.countGreaterOrEqual(7) == 1)
    assert(t.countLess(8) == 1 && t.countGreater(6) == 1)
  }

  test("duplicates collapse into multiplicity") {
    val t = new OrderStatTree
    (1 to 5).foreach(_ => t.insert(3))
    assert(t.size == 5 && t.maxKey == 3)
    assert(t.countLessOrEqual(3) == 5 && t.countLess(3) == 0)
    assert(t.erase(3) && t.size == 4)
    assert(t.contains(3))
    (1 to 4).foreach(_ => assert(t.erase(3)))
    assert(t.isEmpty && !t.erase(3))
  }

  test("ascending insertion stays balanced (no stack overflow, right ops)") {
    val t = new OrderStatTree
    (1 to 100000).foreach(i => t.insert(i.toLong))
    assert(t.size == 100000)
    assert(t.maxKey == 100000)
    assert(t.countLess(50001) == 50000)
    assert(t.countGreaterOrEqual(99999) == 2)
  }

  test("descending insertion stays balanced") {
    val t = new OrderStatTree
    (100000 to 1 by -1).foreach(i => t.insert(i.toLong))
    assert(t.size == 100000 && t.countGreater(0) == 100000 && t.countLess(1) == 0)
  }

  test("erase interior nodes with two children") {
    val t = new OrderStatTree
    Seq(50L, 30L, 70L, 20L, 40L, 60L, 80L).foreach(t.insert)
    assert(t.erase(50))
    assert(!t.contains(50) && t.size == 6)
    assert(t.countLess(100) == 6)
    assert(t.erase(30) && t.erase(70))
    assert(t.size == 4 && t.countGreater(20) == 3)
  }

  test("negative keys (time-reversed streams use negation)") {
    val t = new OrderStatTree
    Seq(-5L, -1L, -9L, 0L, 3L).foreach(t.insert)
    assert(t.maxKey == 3)
    assert(t.countLess(0) == 3 && t.countGreaterOrEqual(-5) == 4)
  }

  for (seed <- 1 to 10)
    test(s"randomized parity with reference multiset (seed $seed)") {
      val rnd = new Random(seed)
      val t = new OrderStatTree
      val ref = ArrayBuffer.empty[Long]
      for (_ <- 1 to 3000) {
        val op = rnd.nextInt(10)
        val key = rnd.nextInt(60).toLong
        if (op < 5) { t.insert(key); ref += key }
        else if (op < 8) {
          val present = ref.contains(key)
          assert(t.erase(key) == present)
          if (present) ref.remove(ref.indexOf(key))
        } else {
          assert(t.size == ref.size)
          assert(t.countLess(key) == ref.count(_ < key), s"countLess($key)")
          assert(t.countLessOrEqual(key) == ref.count(_ <= key), s"countLE($key)")
          assert(t.countGreater(key) == ref.count(_ > key), s"countGreater($key)")
          assert(t.countGreaterOrEqual(key) == ref.count(_ >= key), s"countGE($key)")
          if (ref.nonEmpty) assert(t.maxKey == ref.max)
        }
      }
    }
}
