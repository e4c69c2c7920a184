package repro.exp

import org.scalatest.funsuite.AnyFunSuite
import repro.data.SetGen

/** Tiny-configuration smoke runs of each experiment harness (the full-size
  * versions live in bench/). Validates wiring and basic invariants, not
  * performance.
  */
class ExperimentsSmokeSpec extends AnyFunSuite {

  test("defaultGroups follows the 0.5% rule rounded to a power of two") {
    assert(Harness.defaultGroups(20000) == 128)
    assert(Harness.defaultGroups(1000) >= 4)
    val n = Harness.defaultGroups(100000)
    assert((n & (n - 1)) == 0) // power of two
  }

  test("timeMs returns the result and a non-negative duration") {
    val (r, ms) = Harness.timeMs { 21 * 2 }
    assert(r == 42)
    assert(ms >= 0.0)
  }

  test("sampleQueries draws from the database") {
    val db: Array[Array[Int]] = Array(Array(1), Array(2), Array(3))
    val qs = Harness.sampleQueries(db, 10)
    assert(qs.length == 3)
    assert(qs.forall(q => db.exists(_.sameElements(q))))
  }

  test("Fmt.table renders a header and rows") {
    val s = Fmt.table("t", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("33", "4")))
    assert(s.contains("== t =="))
    assert(s.linesIterator.size == 5)
  }

  test("Table2Exp computes stats for shrunken profiles") {
    val rows = Table2Exp.run(Seq(SetGen.kosarakLite.copy(nSets = 200)))
    assert(rows.length == 1)
    assert(rows.head.measured.nSets == 200)
    assert(Table2Exp.render(rows).nonEmpty)
  }

  test("Fig7 learning curves have the requested epochs") {
    val rows = Fig7Exp.learningCurves(
      Seq(SetGen.kosarakLite.copy(nSets = 300, nTokens = 200)),
      epochs = 3, chunkSize = 200, pairs = 500)
    assert(rows.head.lossPerEpoch.length == 3)
  }

  test("Fig8 tiny run produces one row per representation method") {
    val rows = Fig8Exp.run(sampleSize = 150, nGroups = 4, nQueries = 10, pairs = 400)
    assert(rows.map(_.method) == Seq("PCA", "MDS", "BinaryEnc", "PTR-half", "PTR"))
    assert(rows.forall(r => r.embedMs >= 0 && r.peKnn >= 0 && r.peKnn <= 1))
  }

  test("Fig9 tiny run covers all five partitioners") {
    val rows = Fig9Exp.run(sampleSize = 300, nGroups = 4, nQueries = 10, pairs = 400)
    assert(rows.map(_.method) == Seq("L2P", "PAR-G", "PAR-C", "PAR-D", "PAR-A"))
    assert(rows.forall(_.partitionMs > 0))
  }

  test("Fig14 tiny run produces finite ratios") {
    val rows = Fig14Exp.run(alphas = Seq(1.0, 4.0), nSets = 600, nTokens = 2000,
      hotPool = 30, fineTarget = 8, coarseTarget = 2, nQueries = 10, pairs = 300)
    assert(rows.length == 2)
    assert(rows.forall(r => r.accessRatio > 0 && r.computeRatio > 0))
  }

  test("Fig15 tiny run reports PE for both universes") {
    val rows = Fig15Exp.run(baseSize = 400, ratios = Seq(0.5), nQueries = 10, pairs = 300)
    assert(rows.map(_.universe).distinct.sorted == Seq("closed", "open"))
    assert(rows.forall(r => r.peInsert > 0 && r.peRebuild > 0))
  }
}
