package repro.embed

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class PTRSpec extends AnyFunSuite {

  // Paper running example: T = {A,B,C,D} → ids {0,1,2,3}, h = 2.
  private val pt = new PathTable(4)
  private val A = 0; private val B = 1; private val C = 2; private val D = 3

  test("tree height h = ceil(log2 |T|)") {
    assert(new PathTable(4).h == 2)
    assert(new PathTable(5).h == 3)
    assert(new PathTable(8).h == 3)
    assert(new PathTable(9).h == 4)
    assert(new PathTable(1).h == 1)
    assert(new PathTable(2).h == 1)
  }

  test("paper Table 1: path table entries") {
    // A: 1 1 0 0 / B: 1 0 0 1 / C: 0 1 1 0 / D: 0 0 1 1
    assert((0 until 4).map(pt.entry(A, _)) == Seq(1, 1, 0, 0))
    assert((0 until 4).map(pt.entry(B, _)) == Seq(1, 0, 0, 1))
    assert((0 until 4).map(pt.entry(C, _)) == Seq(0, 1, 1, 0))
    assert((0 until 4).map(pt.entry(D, _)) == Seq(0, 0, 1, 1))
  }

  test("paper example: Rep({A,B,C}) = [2,2,1,1]") {
    assert(pt.rep(Array(A, B, C)).toSeq == Seq(2.0, 2.0, 1.0, 1.0))
  }

  test("paper example: Rep({B,D}) = [1,0,1,2]") {
    assert(pt.rep(Array(B, D)).toSeq == Seq(1.0, 0.0, 1.0, 2.0))
  }

  test("paper multiset example: Rep({A}) = [1,1,0,0], Rep({A,A}) = [2,2,0,0]") {
    assert(pt.rep(Array(A)).toSeq == Seq(1.0, 1.0, 0.0, 0.0))
    assert(pt.rep(Array(A, A)).toSeq == Seq(2.0, 2.0, 0.0, 0.0))
  }

  test("paper PTR-half collision: {A}, {B,C}, {A,D}, {B,C,D} all map to [1,1]") {
    assert(pt.repHalf(Array(A)).toSeq == Seq(1.0, 1.0))
    assert(pt.repHalf(Array(B, C)).toSeq == Seq(1.0, 1.0))
    assert(pt.repHalf(Array(A, D)).toSeq == Seq(1.0, 1.0))
    assert(pt.repHalf(Array(B, C, D)).toSeq == Seq(1.0, 1.0))
    // The full table *reduces* the collision chance (the paper's claim, not
    // elimination): {A} and {B,C,D} become separable, though {B,C} and
    // {A,D} still coincide at [1,1,1,1].
    assert(pt.rep(Array(A)).toSeq != pt.rep(Array(B, C, D)).toSeq)
    assert(pt.rep(Array(A)).toSeq != pt.rep(Array(B, C)).toSeq)
    assert(pt.rep(Array(B, C)).toSeq == pt.rep(Array(A, D)).toSeq)
  }

  test("entry and rep are mutually consistent") {
    val rnd = new Random(1)
    val table = new PathTable(100)
    for (_ <- 1 to 50) {
      val s = Seq.fill(rnd.nextInt(8) + 1)(rnd.nextInt(100)).distinct.sorted.toArray
      val viaEntry = Array.tabulate(table.dim)(i => s.map(table.entry(_, i).toDouble).sum)
      assert(table.rep(s).toSeq == viaEntry.toSeq)
    }
  }

  test("second half is the complement of the first half per token") {
    val table = new PathTable(64)
    for (t <- 0 until 64; i <- 0 until table.h) {
      assert(table.entry(t, i) + table.entry(t, table.h + i) == 1)
    }
  }

  test("no two tokens share a full path") {
    val table = new PathTable(33)
    val paths = (0 until 33).map(t => (0 until table.h).map(table.entry(t, _)))
    assert(paths.distinct.size == 33)
  }

  test("embedders expose the right dimensionality") {
    assert(new PTREmbedder(1000).dim == 20) // h = 10
    assert(new PTRHalfEmbedder(1000).dim == 10)
  }

  test("out-of-universe token rejected by entry") {
    intercept[IllegalArgumentException](pt.entry(4, 0))
  }
}
