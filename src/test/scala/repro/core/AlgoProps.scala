package repro.core

import org.scalacheck.{Gen, Prop, Properties}

import repro.graph.{LocalGraph, TemporalEdge}

/** ScalaCheck properties tying the optimized algorithms to the brute-force
  * reference over arbitrary generated graphs (run by sbt's native
  * ScalaCheck framework alongside the scalatest suites).
  */
object AlgoProps extends Properties("TemporalButterfly") {

  val genEdges: Gen[List[TemporalEdge]] = for {
    nU <- Gen.choose(2, 6)
    nL <- Gen.choose(2, 6)
    n  <- Gen.choose(0, 90)
    tMax <- Gen.oneOf(6L, 40L, 400L)
    edges <- Gen.listOfN(n, for {
      u <- Gen.choose(0, nU - 1)
      v <- Gen.choose(0, nL - 1)
      t <- Gen.choose(0L, tMax)
    } yield TemporalEdge(u.toLong, v.toLong, t))
  } yield edges

  val genDelta: Gen[Long] = Gen.oneOf(1L, 5L, 25L, 100L, 100000L)

  property("TBC == brute force") = Prop.forAll(genEdges, genDelta) { (edges, delta) =>
    val g = LocalGraph.fromEdges(edges)
    LocalAlgos.tbc(g, delta).sameElements(BruteForce.countByType(edges, delta))
  }

  property("TBC+ == brute force") = Prop.forAll(genEdges, genDelta) { (edges, delta) =>
    val g = LocalGraph.fromEdges(edges)
    LocalAlgos.tbcPlus(g, delta).sameElements(BruteForce.countByType(edges, delta))
  }

  property("TBC++ == brute force") = Prop.forAll(genEdges, genDelta) { (edges, delta) =>
    val g = LocalGraph.fromEdges(edges)
    LocalAlgos.tbcPlusPlus(g, delta).sameElements(BruteForce.countByType(edges, delta))
  }

  property("TBE+ multiset == brute force multiset") =
    Prop.forAll(genEdges, genDelta) { (edges, delta) =>
      val g = LocalGraph.fromEdges(edges)
      val got = LocalAlgos.tbePlus(g, delta)._2.groupBy(identity).view.mapValues(_.size).toMap
      val want = BruteForce.enumerate(edges, delta).groupBy(identity).view.mapValues(_.size).toMap
      got == want
    }

  property("enumeration total == counting total") =
    Prop.forAll(genEdges, genDelta) { (edges, delta) =>
      val g = LocalGraph.fromEdges(edges)
      LocalAlgos.tbePlus(g, delta, collect = false)._1 == LocalAlgos.tbcPlusPlus(g, delta).sum
    }

  property("edge order does not change counts") =
    Prop.forAll(genEdges, genDelta) { (edges, delta) =>
      val a = LocalAlgos.tbcPlusPlus(LocalGraph.fromEdges(edges), delta)
      val b = LocalAlgos.tbcPlusPlus(LocalGraph.fromEdges(edges.reverse), delta)
      a.sameElements(b)
    }
}
