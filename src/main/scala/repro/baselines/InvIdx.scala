package repro.baselines

import repro.core.{Hit, KnnResult, RangeResult, SearchStats, SetOps}
import repro.io.IOModel
import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

/** InvIdx — the inverted-index baseline (§7.6, after Wang et al. [67]):
  * a full inverted index in global token-frequency order with query-side
  * prefix filtering plus the Jaccard length filter.
  *
  * Range correctness: order each set's tokens rarest-first and take the
  * query prefix of length |Q| − ⌈δ|Q|⌉ + 1. A set sharing no prefix token
  * has overlap ≤ ⌈δ|Q|⌉ − 1 < δ|Q|, while any set passing the length filter
  * (|S| ≥ δ|Q|) needs overlap ≥ δ(|Q|+|S|)/(1+δ) ≥ δ|Q| to reach Jaccard δ
  * — so scanning only prefix-token postings is exact.
  *
  * kNN follows the paper's adaptation: start at δ = 1.0, fetch candidates,
  * and lower δ by z until the kth-best similarity reaches the current δ.
  *
  * Jaccard-specific (as is the paper's evaluation).
  */
final class InvIdx(db: IndexedSeq[Array[Int]], io: IOModel = IOModel.InMemory) {

  private val nTokens: Int = {
    var max = -1
    for (s <- db; t <- s) if (t > max) max = t
    max + 1
  }

  // token → global frequency, then token → rank (rarest first, ties by id)
  private val freq = {
    val f = new Array[Int](math.max(1, nTokens))
    for (s <- db; t <- s) f(t) += 1
    f
  }
  private val rankOf: Array[Int] = {
    val order = Array.range(0, math.max(1, nTokens)).sortBy(t => (freq(t), t))
    val r = new Array[Int](order.length)
    for (i <- order.indices) r(order(i)) = i
    r
  }

  /** Per-set tokens sorted rarest-first. */
  private val rareSorted: Array[Array[Int]] =
    db.iterator.map(s => s.sortBy(rankOf(_))).toArray

  /** Full inverted index: token → ascending sids. */
  private val postings: Array[Array[Int]] = {
    val builders = Array.fill(math.max(1, nTokens))(new ArrayBuffer[Int]())
    for (sid <- db.indices; t <- db(sid)) builders(t) += sid
    builders.map(_.toArray)
  }

  /** Index footprint: postings (4 B/entry + 8 B/list) + set lengths. */
  def sizeBytes: Long =
    postings.iterator.map(p => 4L * p.length + 8L).sum + 4L * db.length

  private def sortQuery(q: Array[Int]): Array[Int] =
    q.sortBy(t => if (t < nTokens) rankOf(t) else Int.MaxValue)

  private def prefixLen(qLen: Int, delta: Double): Int =
    math.min(qLen, math.max(1, qLen - math.ceil(delta * qLen).toInt + 1))

  def range(q: Array[Int], delta: Double): RangeResult = {
    require(delta > 0.0, "InvIdx range requires delta > 0")
    if (q.isEmpty) return RangeResult(ArrayBuffer.empty, SearchStats(0, 0, 0, 0.0))
    val qs = sortQuery(q)
    val p = prefixLen(qs.length, delta)
    val minLen = math.ceil(delta * qs.length).toInt
    val maxLen = math.floor(qs.length / delta).toInt
    val seen = new java.util.HashSet[Int]()
    val hits = ArrayBuffer.empty[Hit]
    var ioMs = 0.0
    var candidates = 0L
    var i = 0
    while (i < p) {
      val t = qs(i)
      if (t < nTokens && postings(t).nonEmpty) {
        ioMs += io.randomAccess(io.indexBytes(4L * postings(t).length + 8L))
        for (sid <- postings(t)) {
          val len = db(sid).length
          if (len >= minLen && len <= maxLen && seen.add(sid)) {
            ioMs += io.randomAccess(io.dataBytes(len))
            val sim = SetOps.jaccard(q, db(sid))
            candidates += 1
            if (sim >= delta) hits += Hit(sid, sim)
          }
        }
      }
      i += 1
    }
    RangeResult(hits, SearchStats(candidates, 0, 0, ioMs))
  }

  /** kNN via δ-decreasing filtering with step `z` (§7.6). */
  def knn(q: Array[Int], k: Int, z: Double = 0.05): KnnResult = {
    val qs = sortQuery(q)
    val heap = mutable.PriorityQueue.empty[Hit](Ordering.by(h => -h.sim))
    val seen = new java.util.HashSet[Int]()
    var ioMs = 0.0
    var candidates = 0L
    var delta = 1.0
    var done = q.isEmpty

    while (!done) {
      if (qs.nonEmpty) {
        val p = prefixLen(qs.length, delta)
        val minLen = math.max(1, math.ceil(delta * qs.length).toInt)
        val maxLen = math.floor(qs.length / delta).toInt
        var i = 0
        while (i < p) {
          val t = qs(i)
          if (t < nTokens && postings(t).nonEmpty) {
            // The paper's critique of InvIdx kNN (§7.6): the filtering pass
            // is repeated for every δ round, re-reading the prefix postings
            // each time — so each round's list scan is charged.
            ioMs += io.randomAccess(io.indexBytes(4L * postings(t).length + 8L))
            for (sid <- postings(t)) {
              val len = db(sid).length
              if (len >= minLen && len <= maxLen && seen.add(sid)) {
                ioMs += io.randomAccess(io.dataBytes(len))
                val sim = SetOps.jaccard(q, db(sid))
                candidates += 1
                if (heap.size < k) heap.enqueue(Hit(sid, sim))
                else if (sim > heap.head.sim) { heap.dequeue(); heap.enqueue(Hit(sid, sim)) }
              }
            }
          }
          i += 1
        }
      }
      // Terminate once the kth-best reaches the current δ: every unseen set
      // has similarity < δ.
      if (heap.size >= k && heap.head.sim >= delta) done = true
      else if (delta <= 0.0 + 1e-12) {
        // δ exhausted: unseen sets share no token with Q (similarity 0);
        // fill the result with arbitrary unseen sets if still short.
        var sid = 0
        while (heap.size < k && sid < db.length) {
          if (!seen.contains(sid)) {
            heap.enqueue(Hit(sid, SetOps.jaccard(q, db(sid))))
            candidates += 1
          }
          sid += 1
        }
        done = true
      } else delta = math.max(0.0, delta - z)
    }
    KnnResult(ArrayBuffer.from(heap.dequeueAll.reverse),
              SearchStats(candidates, 0, 0, ioMs))
  }
}
