package repro.core

import repro.io.IOModel
import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

/** Per-query instrumentation shared by all engines in this repo.
  *
  * @param candidates number of sets whose similarity to Q was computed
  * @param ubProbes   number of TGM cells (group × query-token) probed
  * @param groupsRead number of groups fetched from storage
  * @param ioMs       simulated storage time under the engine's [[IOModel]]
  */
final case class SearchStats(candidates: Long, ubProbes: Long, groupsRead: Int, ioMs: Double) {
  /** Pruning efficiency for a kNN query (Definition 2.3). */
  def peKnn(nSets: Int, k: Int): Double =
    (nSets - (candidates - math.min(k, nSets)).toDouble) / nSets
  /** Pruning efficiency for a range query (Definition 2.3). */
  def peRange(nSets: Int, resultSize: Int): Double =
    (nSets - (candidates - resultSize).toDouble) / nSets
}

/** One search hit: set id + its similarity to the query. */
final case class Hit(sid: Int, sim: Double)

final case class RangeResult(hits: ArrayBuffer[Hit], stats: SearchStats)
/** kNN hits sorted by descending similarity. */
final case class KnnResult(hits: ArrayBuffer[Hit], stats: SearchStats)

/** The LES³ in-memory engine: a partitioned database + its [[TGM]], with the
  * filter-and-verify algorithms of §3.1/§6 and the update handling of §6.
  *
  * Groups are assumed laid out contiguously on storage (the paper's layout,
  * §7.6), so fetching a candidate group costs one random access of the
  * group's byte footprint under `io`.
  */
final class Les3Index(initialDb: IndexedSeq[Array[Int]], grouping: Grouping,
                      val measure: SetOps.Measure = SetOps.Jaccard,
                      val io: IOModel = IOModel.InMemory) {

  /** Mutable database — §6 allows insertions after the index is built. */
  val db: ArrayBuffer[Array[Int]] = ArrayBuffer.from(initialDb)
  /** Member set ids per group. */
  val members: ArrayBuffer[ArrayBuffer[Int]] =
    ArrayBuffer.from(grouping.members.map(ArrayBuffer.from(_)))
  val tgm: TGM = TGM.build(initialDb, grouping, measure)

  def nSets: Int = db.length
  def nGroups: Int = tgm.nGroups

  private def groupBytes(g: Int): Long = {
    var total = 0L
    val m = members(g)
    var i = 0
    while (i < m.length) { total += io.dataBytes(db(m(i)).length); i += 1 }
    total
  }

  /** Range search (Definition 2.2): verify exactly the groups whose upper
    * bound reaches δ.
    */
  def range(q: Array[Int], delta: Double): RangeResult = {
    val hits = ArrayBuffer.empty[Hit]
    var candidates = 0L
    var ubProbes = 0L
    var groupsRead = 0
    var ioMs = 0.0
    var g = 0
    while (g < tgm.nGroups) {
      ubProbes += q.length
      if (tgm.ub(q, g) >= delta && members(g).nonEmpty) {
        groupsRead += 1
        ioMs += io.randomAccess(groupBytes(g))
        val m = members(g)
        var i = 0
        while (i < m.length) {
          val sid = m(i)
          val sim = measure.sim(q, db(sid))
          candidates += 1
          if (sim >= delta) hits += Hit(sid, sim)
          i += 1
        }
      }
      g += 1
    }
    RangeResult(hits, SearchStats(candidates, ubProbes, groupsRead, ioMs))
  }

  /** kNN search (Definition 2.1): visit groups in descending-UB order,
    * stopping once the next group's bound cannot beat the kth-best
    * similarity found so far. Exact: any unvisited set has
    * sim ≤ UB(group) ≤ kth-best — a set tying the kth-best is
    * interchangeable with it under Definition 2.1, so the cut uses ≤.
    */
  def knn(q: Array[Int], k: Int): KnnResult = {
    val n = tgm.nGroups
    val ubs = new Array[Double](n)
    var g = 0
    while (g < n) { ubs(g) = tgm.ub(q, g); g += 1 }
    val order = Array.range(0, n).sortBy(g => -ubs(g))

    // Min-heap of the best k sims seen so far.
    val heap = mutable.PriorityQueue.empty[Hit](Ordering.by(h => -h.sim))
    var candidates = 0L
    var groupsRead = 0
    var ioMs = 0.0
    var oi = 0
    var done = false
    while (oi < n && !done) {
      val gg = order(oi)
      if (heap.size >= k && ubs(gg) <= heap.head.sim) done = true
      else if (members(gg).nonEmpty) {
        groupsRead += 1
        ioMs += io.randomAccess(groupBytes(gg))
        val m = members(gg)
        var i = 0
        while (i < m.length) {
          val sid = m(i)
          val sim = measure.sim(q, db(sid))
          candidates += 1
          if (heap.size < k) heap.enqueue(Hit(sid, sim))
          else if (sim > heap.head.sim) { heap.dequeue(); heap.enqueue(Hit(sid, sim)) }
          i += 1
        }
      }
      oi += 1
    }
    val hits = ArrayBuffer.from(heap.dequeueAll.reverse)
    KnnResult(hits, SearchStats(candidates, n.toLong * q.length, groupsRead, ioMs))
  }

  /** Insert a new set (§6). The set joins the group with the highest
    * similarity upper bound to its previously-seen tokens (ties → smallest
    * group; no seen tokens → smallest group); unseen tokens simply extend
    * the matrix. Returns (set id, group id).
    */
  def insert(set: Array[Int]): (Int, Int) = {
    val seen = set.filter(_ < tgm.nTokens)
    var best = -1
    var bestUb = -1.0
    var g = 0
    while (g < tgm.nGroups) {
      val u = if (seen.isEmpty) 0.0 else tgm.ub(seen, g)
      if (u > bestUb || (u == bestUb && (best < 0 || members(g).length < members(best).length))) {
        best = g; bestUb = u
      }
      g += 1
    }
    val sid = db.length
    db += set
    members(best) += sid
    tgm.addSet(best, set)
    (sid, best)
  }
}
