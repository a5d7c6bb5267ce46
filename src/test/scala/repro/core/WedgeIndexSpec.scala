package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.collection.mutable.ArrayBuffer
import scala.util.Random

/** Parity between the two index implementations (HP hashmap of TBC+ vs the
  * twin trees of TBC++) and unit coverage of the wedge-list machinery.
  */
class WedgeIndexSpec extends AnyFunSuite {

  /** Reference: plain list with linear-scan case counting. */
  private final class RefIndex {
    val items = ArrayBuffer.empty[(Long, Long)]
    def insert(ts: Long, ta: Long): Unit = items += ((ts, ta))
    def deleteAbove(bound: Long): Unit = items.filterInPlace(_._2 <= bound)
    def cases(curTa: Long): (Long, Long, Long) = {
      var c0 = 0L; var c1 = 0L; var c2 = 0L
      items.foreach { case (ts, ta) =>
        if (ts > curTa) c0 += 1
        else if (ts < curTa) {
          if (ta > curTa) c1 += 1
          else if (ta < curTa) c2 += 1
        }
      }
      (c0, c1, c2)
    }
  }

  private def mkIndexes(): Seq[(String, WedgeIndex)] =
    Seq("HP" -> new HPIndex(withMids = false), "Tree" -> new TreeIndex)

  for (seed <- 1 to 8)
    test(s"HPIndex and TreeIndex match the reference (seed $seed)") {
      val rnd = new Random(seed)
      for ((name, idx) <- mkIndexes()) {
        val ref = new RefIndex
        // The SetCross protocol: inserts happen in ts-descending batches,
        // ta ascending within a batch; queries use strictly smaller curTa.
        var curTs = 1000L
        for (_ <- 1 to 300) {
          rnd.nextInt(3) match {
            case 0 =>
              curTs -= 1 + rnd.nextInt(3)
              val tas = Seq.fill(1 + rnd.nextInt(3))(curTs + 1 + rnd.nextInt(40).toLong).sorted
              tas.foreach { ta => idx.insert(curTs, ta, 0L); ref.insert(curTs, ta) }
            case 1 =>
              val bound = curTs + rnd.nextInt(45)
              idx.deleteAbove(bound); ref.deleteAbove(bound)
            case 2 =>
              val curTa = curTs - 1 + rnd.nextInt(45)
              val out = new Array[Long](3)
              idx.countCases(curTa, out)
              val (c0, c1, c2) = ref.cases(curTa)
              assert(out(0) == c0 && out(1) == c1 && out(2) == c2,
                s"$name cases($curTa): got ${out.mkString(",")} want $c0,$c1,$c2")
          }
        }
      }
    }

  test("HPIndex visitCases visits exactly what countCases counts") {
    val rnd = new Random(99)
    val idx = new HPIndex(withMids = true)
    var ts = 500L
    for (_ <- 1 to 60) {
      ts -= 1 + rnd.nextInt(2)
      idx.insert(ts, ts + 1 + rnd.nextInt(30), rnd.nextInt(5).toLong)
    }
    for (curTa <- Seq(470L, 490L, 510L, 530L)) {
      val out = new Array[Long](3)
      idx.countCases(curTa, out)
      val seen = new Array[Long](3)
      idx.visitCases(curTa)((c, _, _, _) => seen(c) += 1)
      assert(out.sameElements(seen), s"curTa=$curTa")
    }
  }

  test("TreeIndex rejects enumeration") {
    intercept[UnsupportedOperationException](new TreeIndex().visitCases(0L)((_, _, _, _) => ()))
  }

  test("WList.sorted orders by wedge priority (ts desc, ta asc)") {
    val buf = ArrayBuffer((3L, 9L), (5L, 7L), (3L, 4L), (5L, 6L), (1L, 2L))
    val w = WList.sorted(buf, 42L)
    assert(w.ts.toSeq == Seq(5L, 5L, 3L, 3L, 1L))
    assert(w.ta.toSeq == Seq(6L, 7L, 4L, 9L, 2L))
    assert(w.mid.forall(_ == 42L))
  }

  test("WList.merge preserves wedge-priority order") {
    val a = WList.sorted(ArrayBuffer((9L, 10L), (5L, 6L), (2L, 8L)), 1L)
    val b = WList.sorted(ArrayBuffer((9L, 11L), (7L, 8L), (2L, 3L)), 2L)
    val m = WList.merge(a, b)
    assert(m.size == 6)
    val pairs = m.ts.zip(m.ta).toSeq
    assert(pairs == Seq((9L, 10L), (9L, 11L), (7L, 8L), (5L, 6L), (2L, 3L), (2L, 8L)))
  }

  test("WList.merge with an empty side returns the other") {
    val a = WList.sorted(ArrayBuffer((4L, 5L)), 1L)
    assert(WList.merge(a, WList.empty) eq a)
    assert(WList.merge(WList.empty, a) eq a)
  }

  test("buildSides applies Lemma 1 pruning and direction split") {
    val wedges = ArrayBuffer(
      (1L, 3L, 8L),   // forward, span 5
      (1L, 8L, 3L),   // backward, span 5
      (1L, 4L, 4L),   // equal stamps -> pruned
      (1L, 0L, 100L), // span > delta -> pruned
      (2L, 6L, 7L))   // second middle
    val sides = LocalCombine.buildSides(wedges, delta = 10L)
    assert(sides.length == 2)
    assert(sides(0).a.size == 1 && sides(0).d.size == 1)
    assert(sides(0).d.ts(0) == 3L && sides(0).d.ta(0) == 8L) // swapped on insert
    assert(sides(1).a.size == 1 && sides(1).d.size == 0)
  }

  test("buildSides on all-pruned input yields no sides") {
    val wedges = ArrayBuffer((1L, 5L, 5L), (2L, 0L, 99L))
    assert(LocalCombine.buildSides(wedges, delta = 3L).isEmpty)
  }
}
