package repro.rtree

import org.scalatest.funsuite.AnyFunSuite
import scala.collection.mutable.ArrayBuffer
import scala.util.Random

class RTreeSpec extends AnyFunSuite {

  private def randomPoints(n: Int, dim: Int, seed: Long): Array[Array[Int]] = {
    val rnd = new Random(seed)
    Array.fill(n)(Array.fill(dim)(rnd.nextInt(1000)))
  }

  private def allIds(n: RTree.Node): Seq[Int] = n match {
    case RTree.Leaf(ids, _, _) => ids.toSeq
    case RTree.Inner(ch, _, _) => ch.flatMap(allIds).toSeq
  }

  test("bulk load indexes every point exactly once") {
    val pts = randomPoints(500, 3, 1)
    val tree = RTree.bulkLoad(pts)
    assert(allIds(tree.root).sorted == (0 until 500))
  }

  test("MBRs contain all child points (invariant over the whole tree)") {
    val pts = randomPoints(300, 4, 2)
    val tree = RTree.bulkLoad(pts)
    def check(n: RTree.Node): Unit = n match {
      case RTree.Leaf(ids, lo, hi) =>
        for (id <- ids; d <- 0 until 4) {
          assert(pts(id)(d) >= lo(d) && pts(id)(d) <= hi(d))
        }
      case RTree.Inner(ch, lo, hi) =>
        for (c <- ch; d <- 0 until 4) {
          assert(c.lo(d) >= lo(d) && c.hi(d) <= hi(d))
        }
        ch.foreach(check)
    }
    check(tree.root)
  }

  test("fanout is respected") {
    val pts = randomPoints(1000, 2, 3)
    val tree = RTree.bulkLoad(pts, fanout = 16)
    def check(n: RTree.Node): Unit = n match {
      case RTree.Leaf(ids, _, _) => assert(ids.length <= 16)
      case RTree.Inner(ch, _, _) => assert(ch.length <= 16); ch.foreach(check)
    }
    check(tree.root)
  }

  test("single-point tree") {
    val tree = RTree.bulkLoad(Array(Array(5, 5)))
    assert(allIds(tree.root) == Seq(0))
    assert(tree.root.lo.toSeq == Seq(5, 5))
  }

  test("rangeSearch with an always-true bound visits everything") {
    val pts = randomPoints(200, 2, 4)
    val tree = RTree.bulkLoad(pts)
    val found = ArrayBuffer.empty[Int]
    tree.rangeSearch(_ => 1.0, 0.5, _ => (), found += _)
    assert(found.sorted.toSeq == (0 until 200))
  }

  test("rangeSearch prunes below-threshold nodes") {
    // bound = negated distance of MBR to origin; threshold excludes far nodes
    val pts = Array.tabulate(100)(i => Array(i * 10, 0))
    val tree = RTree.bulkLoad(pts, fanout = 4)
    val found = ArrayBuffer.empty[Int]
    var nodes = 0
    tree.rangeSearch(n => -n.lo(0).toDouble, -100.0, _ => nodes += 1, found += _)
    // only points with x ≤ 100 can be in surviving leaves
    assert(found.forall(id => pts(id)(0) <= 100 + 4 * 10))
    assert(nodes < tree.nodeCount)
  }

  test("bestFirst visits highest-bound leaves first") {
    val pts = Array.tabulate(64)(i => Array(i))
    val tree = RTree.bulkLoad(pts, fanout = 4)
    val seen = ArrayBuffer.empty[Int]
    tree.bestFirst(n => n.hi(0).toDouble, _ => seen.length < 8, _ => (), seen += _)
    // the first visited leaf must contain the maximum point
    assert(seen.take(4).contains(63))
  }

  test("bestFirst stops when continueWith fails") {
    val pts = randomPoints(100, 2, 5)
    val tree = RTree.bulkLoad(pts)
    var visited = 0
    tree.bestFirst(_ => 0.0, _ => false, _ => visited += 1, _ => ())
    assert(visited == 0)
  }

  test("sizeBytes and nodeCount are positive and consistent") {
    val pts = randomPoints(300, 3, 6)
    val tree = RTree.bulkLoad(pts, fanout = 8)
    assert(tree.nodeCount > 300 / 8)
    assert(tree.sizeBytes > 0)
  }
}
