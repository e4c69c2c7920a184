package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core.SetOps
import scala.util.Random

class SetGenSpec extends AnyFunSuite {

  private val small = SetGen.kosarakLite.copy(nSets = 500, nTokens = 200)

  test("generation is deterministic in (profile, sid)") {
    for (sid <- 0L until 50L) {
      assert(SetGen.generate(small, sid).toSeq == SetGen.generate(small, sid).toSeq)
    }
  }

  test("different sids give different sets (almost always)") {
    val distinct = (0L until 100L).map(SetGen.generate(small, _).toSeq).distinct
    assert(distinct.size > 80)
  }

  test("different seeds give different databases") {
    val a = SetGen.generate(small, 1L).toSeq
    val b = SetGen.generate(small.copy(seed = small.seed + 1), 1L).toSeq
    assert(a != b || SetGen.generate(small, 2L).toSeq !=
      SetGen.generate(small.copy(seed = small.seed + 1), 2L).toSeq)
  }

  test("sets are sorted-distinct with tokens inside the universe") {
    for (sid <- 0L until 200L) {
      val s = SetGen.generate(small, sid)
      assert(s.nonEmpty)
      assert(s.toSeq == s.toSeq.distinct.sorted)
      assert(s.forall(t => t >= 0 && t < small.nTokens))
    }
  }

  test("set sizes respect the profile cap and rough mean") {
    val db = SetGen.local(small.copy(nSets = 2000))
    val sizes = db.map(_.length)
    assert(sizes.max <= small.maxSize)
    assert(sizes.min >= 1)
    val avg = sizes.sum.toDouble / sizes.length
    assert(avg > small.avgSize * 0.4 && avg < small.avgSize * 1.6,
      s"avg size $avg far from target ${small.avgSize}")
  }

  test("token frequency is skewed (Zipf): low ids more frequent") {
    val db = SetGen.local(small.copy(nSets = 3000))
    val freq = new Array[Int](small.nTokens)
    db.foreach(_.foreach(freq(_) += 1))
    val lowMass = freq.take(20).map(_.toLong).sum
    val highMass = freq.takeRight(20).map(_.toLong).sum
    assert(lowMass > highMass * 5)
  }

  test("stats computes Table 2 quantities") {
    val db: Array[Array[Int]] = Array(Array(1, 2, 3), Array(4), Array(1, 5))
    val s = SetGen.stats(db)
    assert(s.nSets == 3)
    assert(s.maxSize == 3 && s.minSize == 1)
    assert(math.abs(s.avgSize - 2.0) < 1e-9)
    assert(s.nTokens == 5)
  }

  test("all table2 profiles generate valid small samples") {
    for (p <- SetGen.table2Profiles) {
      val shrunk = p.copy(nSets = 50)
      val db = SetGen.local(shrunk)
      assert(db.length == 50)
      assert(db.forall(s => s.nonEmpty && s.forall(t => t >= 0 && t < p.nTokens)))
    }
  }

  test("powerLawSim: larger alpha means less pairwise similarity mass") {
    def simMass(alpha: Double): Double = {
      val db = SetGen.powerLawSim(alpha, nSets = 400, nTokens = 4000, setSize = 20,
        hotPool = 40)
      val rnd = new Random(5)
      var s = 0.0
      for (_ <- 1 to 4000) {
        s += SetOps.jaccard(db(rnd.nextInt(db.length)), db(rnd.nextInt(db.length)))
      }
      s
    }
    val lowAlpha = simMass(1.0)
    val highAlpha = simMass(5.0)
    assert(lowAlpha > highAlpha * 1.5, s"low=$lowAlpha high=$highAlpha")
  }

  test("powerLawSim sets have the requested size") {
    val db = SetGen.powerLawSim(2.0, nSets = 100, nTokens = 2000, setSize = 15, hotPool = 30)
    assert(db.forall(_.length == 15))
  }

  test("closedUpdates stay within the original universe") {
    val ups = SetGen.closedUpdates(small, 100)
    assert(ups.length == 100)
    assert(ups.forall(_.forall(t => t >= 0 && t < small.nTokens)))
  }

  test("openUpdates contain both seen and unseen tokens") {
    val ups = SetGen.openUpdates(small, 100, small.nTokens / 2)
    assert(ups.exists(_.exists(_ >= small.nTokens)))
    assert(ups.exists(_.exists(_ < small.nTokens)))
    // still sorted-distinct
    assert(ups.forall(s => s.toSeq == s.toSeq.distinct.sorted))
  }

  test("explodedDF row count equals total token occurrences") {
    // exploded form is driven by the local arrays, independent of Spark here
    val db: Array[Array[Int]] = Array(Array(1, 2), Array(3))
    // count check happens in SparkSearchSpec where a session exists; here
    // we just validate local shape invariants used to build it
    assert(db.map(_.length).sum == 3)
  }
}
