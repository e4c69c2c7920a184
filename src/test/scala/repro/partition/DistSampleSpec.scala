package repro.partition

import org.scalatest.funsuite.AnyFunSuite
import scala.collection.mutable.ArrayBuffer
import scala.util.Random

class DistSampleSpec extends AnyFunSuite {

  private val db: Array[Array[Int]] = Array(
    Array(1, 2), Array(1, 2), Array(1, 2, 3), Array(50), Array(60))

  test("avgDistTo is 0 against identical sets") {
    val rnd = new Random(1)
    val g = ArrayBuffer(0, 1)
    val d = DistSample.avgDistTo(db, 0, g, 10, repro.core.SetOps.Jaccard, rnd)
    assert(d == 0.0)
  }

  test("avgDistTo is 1 against disjoint sets") {
    val rnd = new Random(2)
    val g = ArrayBuffer(3, 4)
    val d = DistSample.avgDistTo(db, 0, g, 10, repro.core.SetOps.Jaccard, rnd)
    assert(d == 1.0)
  }

  test("avgDistTo excludes the set itself") {
    val rnd = new Random(3)
    val g = ArrayBuffer(0, 3) // includes sid 0 itself and a disjoint set
    val d = DistSample.avgDistTo(db, 0, g, 50, repro.core.SetOps.Jaccard, rnd)
    assert(d == 1.0) // only the disjoint set counted
  }

  test("phiSampled of a singleton group is 0") {
    val rnd = new Random(4)
    assert(DistSample.phiSampled(db, ArrayBuffer(0), 10, repro.core.SetOps.Jaccard, rnd) == 0.0)
  }

  test("phiSampled approximates exact phi on a tiny group (loose: sample capped at n(n-1))") {
    val rnd = new Random(5)
    val g = ArrayBuffer(0, 1, 2, 3)
    var exact = 0.0
    for (i <- g; j <- g if i != j)
      exact += 1.0 - repro.core.SetOps.jaccard(db(i), db(j))
    val approx = DistSample.phiSampled(db, g, 2000, repro.core.SetOps.Jaccard, rnd)
    assert(math.abs(approx - exact) / exact < 0.5)
  }

  test("phiSampled converges on a larger group") {
    val rnd = new Random(55)
    val big: Array[Array[Int]] =
      Array.fill(40)(repro.core.SetOps.canon(Seq.fill(rnd.nextInt(6) + 2)(rnd.nextInt(30))))
    val g = ArrayBuffer.from(big.indices)
    var exact = 0.0
    for (i <- g; j <- g if i != j)
      exact += 1.0 - repro.core.SetOps.jaccard(big(i), big(j))
    val approx = DistSample.phiSampled(big, g, 1500, repro.core.SetOps.Jaccard, rnd)
    assert(math.abs(approx - exact) / exact < 0.1,
      s"exact=$exact approx=$approx")
  }

  test("avgCrossDist between identical-content groups is 0") {
    val rnd = new Random(6)
    assert(DistSample.avgCrossDist(db, ArrayBuffer(0), ArrayBuffer(1), 10,
      repro.core.SetOps.Jaccard, rnd) == 0.0)
  }

  test("IndexedGroups move keeps structures consistent") {
    val rnd = new Random(7)
    val state = new DistSample.IndexedGroups(Array(0, 0, 1, 1, 2), 3)
    state.move(0, 2)
    assert(state.assign(0) == 2)
    assert(state.groups(0).toSet == Set(1))
    assert(state.groups(2).toSet == Set(4, 0))
    // random moves keep the bijection intact
    for (_ <- 1 to 200) {
      val sid = rnd.nextInt(5)
      state.move(sid, rnd.nextInt(3))
      assert(state.groups.map(_.length).sum == 5)
      for (g <- 0 until 3; m <- state.groups(g)) assert(state.assign(m) == g)
    }
  }

  test("IndexedGroups move to the same group is a no-op") {
    val state = new DistSample.IndexedGroups(Array(0, 1), 2)
    state.move(0, 0)
    assert(state.groups(0).toSeq == Seq(0))
  }

  test("toGrouping round-trips") {
    val state = new DistSample.IndexedGroups(Array(0, 1, 0), 2)
    state.move(1, 0)
    val g = state.toGrouping
    assert(g.assignment.toSeq == Seq(0, 0, 0))
  }
}
