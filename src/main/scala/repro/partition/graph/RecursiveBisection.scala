package repro.partition.graph

import repro.core.Grouping
import scala.collection.mutable.ArrayBuffer
import scala.util.Random

/** Balanced graph partitioning by recursive bisection with
  * Fiduccia–Mattheyses-style refinement — the from-scratch stand-in for
  * PaToH in PAR-G (§4.3.1, see DESIGN.md Substitutions).
  *
  * Each bisection: grow one side by BFS from a random seed until it holds
  * the target share of vertices, then run boundary-refinement passes that
  * greedily move the highest-gain vertex across the cut while a balance
  * tolerance holds.
  */
object RecursiveBisection {

  final case class Config(refinePasses: Int = 4, balanceTolerance: Double = 1.05,
                          seed: Long = 67)

  /** Partition `0 until adj.length` into `nParts` balanced parts. */
  def partition(adj: Array[Array[Int]], nParts: Int,
                cfg: Config = Config()): Grouping = {
    val n = adj.length
    val assignment = new Array[Int](n)
    val rnd = new Random(cfg.seed)
    var nextGroup = 0

    def bisect(vertices: Array[Int], parts: Int): Unit = {
      if (parts <= 1 || vertices.length <= 1) {
        val g = nextGroup
        nextGroup += 1
        vertices.foreach(assignment(_) = g)
        return
      }
      val leftParts = parts / 2
      val rightParts = parts - leftParts
      val targetLeft = math.min(vertices.length - 1,
        math.max(1, (vertices.length.toLong * leftParts / parts).toInt))

      val inScope = new java.util.HashSet[Int](vertices.length * 2)
      vertices.foreach(inScope.add(_))
      val side = new java.util.HashMap[Int, Boolean](vertices.length * 2) // true = left
      vertices.foreach(v => side.put(v, false))

      // BFS growth of the left side from a random seed
      var leftCount = 0
      val queue = new java.util.ArrayDeque[Int]()
      val enqueued = new java.util.HashSet[Int]()
      var cursor = 0
      val shuffled = rnd.shuffle(vertices.toVector).toArray
      while (leftCount < targetLeft) {
        if (queue.isEmpty) {
          // find an unassigned seed
          while (cursor < shuffled.length && side.get(shuffled(cursor))) cursor += 1
          if (cursor >= shuffled.length) return fin()
          queue.add(shuffled(cursor))
          enqueued.add(shuffled(cursor))
        }
        val v = queue.poll()
        if (!side.get(v)) {
          side.put(v, true)
          leftCount += 1
          for (nb <- adj(v) if inScope.contains(nb) && !side.get(nb) && enqueued.add(nb))
            queue.add(nb)
        }
      }

      // FM-style refinement: greedy positive-gain moves with balance guard.
      def fin(): Unit = {
        val maxLeft = math.max(1, (targetLeft * cfg.balanceTolerance).toInt)
        val maxRight = math.max(1, ((vertices.length - targetLeft) * cfg.balanceTolerance).toInt)
        var pass = 0
        var improved = true
        while (pass < cfg.refinePasses && improved) {
          improved = false
          for (v <- vertices) {
            val vLeft = side.get(v)
            var sameSide = 0
            var otherSide = 0
            for (nb <- adj(v) if inScope.contains(nb)) {
              if (side.get(nb) == vLeft) sameSide += 1 else otherSide += 1
            }
            val gain = otherSide - sameSide
            if (gain > 0) {
              val newLeft = if (vLeft) leftCount - 1 else leftCount + 1
              val newRight = vertices.length - newLeft
              if (newLeft <= maxLeft && newRight <= maxRight && newLeft >= 1 && newRight >= 1) {
                side.put(v, !vLeft)
                leftCount = newLeft
                improved = true
              }
            }
          }
          pass += 1
        }
        val left = ArrayBuffer.empty[Int]
        val right = ArrayBuffer.empty[Int]
        for (v <- vertices) if (side.get(v)) left += v else right += v
        bisect(left.toArray, leftParts)
        bisect(right.toArray, rightParts)
      }
      fin()
    }

    bisect(Array.range(0, n), nParts)
    new Grouping(assignment, nextGroup)
  }

  /** Edge-cut of a grouping over the graph (for tests and reporting). */
  def cutSize(adj: Array[Array[Int]], grouping: Grouping): Long = {
    var cut = 0L
    for (v <- adj.indices; nb <- adj(v) if nb > v
         if grouping.assignment(v) != grouping.assignment(nb)) cut += 1
    cut
  }
}
