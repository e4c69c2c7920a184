package repro.core

import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

/** Hierarchical TGM (§5.2, evaluated in §7.7).
  *
  * The L2P cascade yields nested groupings; HTGM keeps a [[TGM]] per
  * retained level plus the child links between consecutive levels. Search
  * proceeds best-first through the hierarchy: a coarse group's bound is
  * probed first and, only if it survives, the bounds of its children —
  * so a pruned coarse group eliminates all verification *and all index
  * probing* below it, which is exactly the trade-off Fig. 14 measures.
  *
  * @param levels     one grouping per retained level, coarse → fine; each
  *                   must be a refinement of the previous
  * @param levelTgms  the TGM of each level
  * @param children   children(l)(g) = ids of level-(l+1) groups nested in
  *                   level-l group g
  */
final class HTGM private (val levels: IndexedSeq[Grouping],
                          val levelTgms: IndexedSeq[TGM],
                          children: IndexedSeq[Array[Array[Int]]],
                          db: IndexedSeq[Array[Int]],
                          measure: SetOps.Measure) {

  private val fine = levels.last
  private val fineMembers = fine.members
  private def lastLevel = levels.length - 1

  /** kNN with hierarchical pruning; counts the same stats as [[Les3Index]]
    * (ubProbes counts cells probed across *all* levels).
    */
  def knn(q: Array[Int], k: Int): KnnResult = {
    // Entries are (level, group, ub); fine-level entries get verified.
    final case class Entry(level: Int, g: Int, ub: Double)
    val pq = mutable.PriorityQueue.empty[Entry](Ordering.by(_.ub))
    var ubProbes = 0L
    var candidates = 0L
    var groupsRead = 0
    val t0 = levelTgms(0)
    var g = 0
    while (g < t0.nGroups) {
      ubProbes += q.length
      pq.enqueue(Entry(0, g, t0.ub(q, g)))
      g += 1
    }
    val heap = mutable.PriorityQueue.empty[Hit](Ordering.by(h => -h.sim))
    var done = false
    while (pq.nonEmpty && !done) {
      val e = pq.dequeue()
      if (heap.size >= k && e.ub <= heap.head.sim) done = true
      else if (e.level < lastLevel) {
        val tgmNext = levelTgms(e.level + 1)
        for (child <- children(e.level)(e.g)) {
          ubProbes += q.length
          pq.enqueue(Entry(e.level + 1, child, tgmNext.ub(q, child)))
        }
      } else {
        groupsRead += 1
        for (sid <- fineMembers(e.g)) {
          val sim = measure.sim(q, db(sid))
          candidates += 1
          if (heap.size < k) heap.enqueue(Hit(sid, sim))
          else if (sim > heap.head.sim) { heap.dequeue(); heap.enqueue(Hit(sid, sim)) }
        }
      }
    }
    KnnResult(ArrayBuffer.from(heap.dequeueAll.reverse),
              SearchStats(candidates, ubProbes, groupsRead, 0.0))
  }

  /** Range search with hierarchical pruning. */
  def range(q: Array[Int], delta: Double): RangeResult = {
    var ubProbes = 0L
    var candidates = 0L
    var groupsRead = 0
    val hits = ArrayBuffer.empty[Hit]
    var frontier = Array.range(0, levelTgms(0).nGroups)
    var level = 0
    while (level < levels.length) {
      val tgm = levelTgms(level)
      val survivors = ArrayBuffer.empty[Int]
      for (g <- frontier) {
        ubProbes += q.length
        if (tgm.ub(q, g) >= delta) survivors += g
      }
      if (level == lastLevel) {
        for (g <- survivors) {
          groupsRead += 1
          for (sid <- fineMembers(g)) {
            val sim = measure.sim(q, db(sid))
            candidates += 1
            if (sim >= delta) hits += Hit(sid, sim)
          }
        }
        frontier = Array.empty
      } else {
        frontier = survivors.toArray.flatMap(children(level)(_))
      }
      level += 1
    }
    RangeResult(hits, SearchStats(candidates, ubProbes, groupsRead, 0.0))
  }
}

object HTGM {

  /** Build from nested groupings (coarse first). Verifies nesting: every
    * fine group must lie entirely inside one group of the previous level.
    */
  def build(db: IndexedSeq[Array[Int]], levels: Seq[Grouping],
            measure: SetOps.Measure = SetOps.Jaccard): HTGM = {
    require(levels.nonEmpty, "need at least one level")
    val tgms = levels.map(TGM.build(db, _, measure)).toIndexedSeq
    val children: IndexedSeq[Array[Array[Int]]] =
      (if (levels.length < 2) Iterator.empty[Seq[Grouping]] else levels.sliding(2)).map {
        case Seq(coarse, fineG) =>
          val parentOf = new Array[Int](fineG.nGroups)
          java.util.Arrays.fill(parentOf, -1)
          var sid = 0
          while (sid < db.length) {
            val p = coarse.assignment(sid)
            val f = fineG.assignment(sid)
            require(parentOf(f) == -1 || parentOf(f) == p,
              s"grouping at level is not nested: fine group $f spans coarse groups")
            parentOf(f) = p
            sid += 1
          }
          val buckets = Array.fill(coarse.nGroups)(ArrayBuffer.empty[Int])
          for (f <- 0 until fineG.nGroups if parentOf(f) >= 0) buckets(parentOf(f)) += f
          buckets.map(_.toArray)
      }.toIndexedSeq
    new HTGM(levels.toIndexedSeq, tgms, children, db, measure)
  }
}
