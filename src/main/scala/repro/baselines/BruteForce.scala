package repro.baselines

import repro.core.{Hit, KnnResult, RangeResult, SearchStats, SetOps}
import repro.io.IOModel
import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

/** The brute-force comparator of §7.6: one linear scan of the database per
  * query. In the disk-based setting this is a single sequential scan — the
  * access pattern that makes brute force surprisingly competitive on HDDs
  * (Fig. 13).
  */
final class BruteForce(db: IndexedSeq[Array[Int]],
                       measure: SetOps.Measure = SetOps.Jaccard,
                       io: IOModel = IOModel.InMemory) {

  private val totalBytes: Long = db.iterator.map(s => io.dataBytes(s.length)).sum

  def range(q: Array[Int], delta: Double): RangeResult = {
    val hits = ArrayBuffer.empty[Hit]
    var sid = 0
    while (sid < db.length) {
      val sim = measure.sim(q, db(sid))
      if (sim >= delta) hits += Hit(sid, sim)
      sid += 1
    }
    RangeResult(hits, SearchStats(db.length, 0, 1, io.sequentialScan(totalBytes)))
  }

  def knn(q: Array[Int], k: Int): KnnResult = {
    val heap = mutable.PriorityQueue.empty[Hit](Ordering.by(h => -h.sim))
    var sid = 0
    while (sid < db.length) {
      val sim = measure.sim(q, db(sid))
      if (heap.size < k) heap.enqueue(Hit(sid, sim))
      else if (sim > heap.head.sim) { heap.dequeue(); heap.enqueue(Hit(sid, sim)) }
      sid += 1
    }
    KnnResult(ArrayBuffer.from(heap.dequeueAll.reverse),
              SearchStats(db.length, 0, 1, io.sequentialScan(totalBytes)))
  }
}
