package repro.core.model

import scala.collection.mutable

/** Graph algorithms running *directly on a hierarchical summary* via partial
  * decompression (paper §VIII-C, Algorithms 5 and 6): the input graph is only
  * accessed through `HierSummary.neighbors`, never fully decompressed.
  */
object SummaryAlgos {

  /** Depth-first search (Algorithm 5); returns visit order from `start`. */
  def dfs(s: HierSummary, start: Int): Seq[Int] = {
    val visited = mutable.LinkedHashSet.empty[Int]
    def go(v: Int): Unit = {
      visited += v
      s.neighbors(v).toSeq.sorted.foreach(u => if (!visited.contains(u)) go(u))
    }
    go(start)
    visited.toSeq
  }

  /** Breadth-first search; returns distance map from `start`. */
  def bfs(s: HierSummary, start: Int): Map[Int, Int] = {
    val dist = mutable.HashMap(start -> 0)
    val q = mutable.ArrayDeque(start)
    while (q.nonEmpty) {
      val v = q.removeHead()
      s.neighbors(v).foreach { u =>
        if (!dist.contains(u)) { dist(u) = dist(v) + 1; q.append(u) }
      }
    }
    dist.toMap
  }

  /** PageRank with uniform teleport (Algorithm 6). */
  def pageRank(s: HierSummary, d: Double = 0.85, iters: Int = 20): Array[Double] = {
    val n = s.nSub
    var r = Array.fill(n)(1.0 / n)
    val nbrs = Array.tabulate(n)(v => s.neighbors(v).toArray)
    var it = 0
    while (it < iters) {
      val next = new Array[Double](n)
      var u = 0
      while (u < n) {
        val ns = nbrs(u)
        if (ns.nonEmpty) {
          val share = r(u) / ns.length
          ns.foreach(w => next(w) += share)
        }
        u += 1
      }
      val leaked = 1.0 - d * next.sum
      r = next.map(x => d * x + leaked / n)
      it += 1
    }
    r
  }

  /** Triangle count through neighbor retrieval only. */
  def triangles(s: HierSummary): Long = {
    var t = 0L
    (0 until s.nSub).foreach { v =>
      val nv = s.neighbors(v).filter(_ > v)
      nv.foreach { u =>
        val nu = s.neighbors(u)
        t += nv.count(w => w > u && nu.contains(w))
      }
    }
    t
  }
}
