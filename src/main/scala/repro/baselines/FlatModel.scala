package repro.baselines

import repro.core.model.HierSummary
import repro.graph.LocalGraph
import scala.collection.mutable

/** The previous (flat) graph summarization model of Navlakha et al. —
  * disjoint supernodes, P edges between supernodes, C+/C- corrections
  * between subnodes.
  *
  * Baselines operate on a [[FlatState]] (supernode membership + aggregated
  * subedge counts) and finish with [[FlatModel.encode]], which computes the
  * optimal P/C+/C- for the chosen grouping in O(|E|) (paper §III-B4 Step 3 /
  * [2]) and lifts the result into a [[HierSummary]] with height-1 trees so
  * that cost and metrics are measured uniformly via Eq. (11):
  * |P| + |C+| + |C-| + |H*| where |H*| = Σ_{|A|>=2} |A|.
  */
object FlatModel {

  /** Optimal flat encoding for a grouping: per supernode pair choose plain
    * subedges (cost E_AB) or one p-edge plus n-corrections (cost 1+T_AB-E_AB).
    */
  def encode(g: LocalGraph, superOf: Array[Int]): HierSummary = {
    val n = g.n
    // dense supernode ids and member lists
    val members = mutable.HashMap.empty[Int, mutable.ArrayBuffer[Int]]
    (0 until n).foreach(u => members.getOrElseUpdate(superOf(u), mutable.ArrayBuffer.empty) += u)
    val groupIds = members.keys.toArray.sorted
    // super id layout in the HierSummary: singletons keep their subnode id;
    // each group with >= 2 members gets a fresh id.
    val parent = mutable.ArrayBuffer.tabulate(n)(_ => -1)
    val supIdOf = mutable.HashMap.empty[Int, Int] // group -> summary super id
    groupIds.foreach { gid =>
      val ms = members(gid)
      if (ms.length == 1) supIdOf(gid) = ms.head
      else {
        val sid = parent.length
        parent += -1
        ms.foreach(u => parent(u) = sid)
        supIdOf(gid) = sid
      }
    }
    // subedge counts per group pair
    val cnt = mutable.HashMap.empty[Long, Int]
    def key(a: Int, b: Int): Long = if (a <= b) a.toLong << 32 | b.toLong else b.toLong << 32 | a.toLong
    g.edges.foreach { case (u, v) =>
      val k = key(superOf(u), superOf(v))
      cnt(k) = cnt.getOrElse(k, 0) + 1
    }
    val pp = mutable.ArrayBuffer.empty[(Int, Int)]
    val pm = mutable.ArrayBuffer.empty[(Int, Int)]
    cnt.foreach { case (k, e) =>
      val ga = (k >>> 32).toInt; val gb = (k & 0xFFFFFFFFL).toInt
      val la = members(ga); val lb = members(gb)
      val t = if (ga == gb) la.length.toLong * (la.length - 1) / 2 else la.length.toLong * lb.length
      if (e.toLong <= 1L + t - e) {
        // plain subedges
        la.foreach { u =>
          if (ga == gb) la.foreach(v => if (u < v && g.hasEdge(u, v)) pp += ((u, v)))
          else lb.foreach(v => if (g.hasEdge(u, v)) pp += ((math.min(u, v), math.max(u, v))))
        }
      } else {
        val sa = supIdOf(ga); val sb = supIdOf(gb)
        pp += ((math.min(sa, sb), math.max(sa, sb)))
        if (ga == gb) {
          var i = 0
          while (i < la.length) {
            var j = i + 1
            while (j < la.length) { if (!g.hasEdge(la(i), la(j))) pm += ((la(i), la(j))); j += 1 }
            i += 1
          }
        } else {
          la.foreach(u => lb.foreach(v => if (!g.hasEdge(u, v)) pm += ((math.min(u, v), math.max(u, v)))))
        }
      }
    }
    HierSummary(n, parent.toArray, Array.fill(parent.length)(true), pp.toSeq, pm.toSeq)
  }
}

/** Mutable supernode grouping with aggregated subedge counts — the working
  * state shared by the flat-model baselines.
  */
final class FlatState(val g: LocalGraph) {
  val n: Int = g.n
  private val uf = Array.tabulate(n)(identity)
  val sizeOf = mutable.HashMap.empty[Int, Int]
  /** root -> (neighbor root -> subedge count); self entry = internal count. */
  val cnt = mutable.HashMap.empty[Int, mutable.HashMap[Int, Int]]

  (0 until n).foreach { u => sizeOf(u) = 1; cnt(u) = mutable.HashMap.empty }
  g.edges.foreach { case (u, v) =>
    cnt(u)(v) = 1; cnt(v)(u) = 1
  }

  def find(x: Int): Int = {
    var r = x
    while (uf(r) != r) r = uf(r)
    var c = x
    while (uf(c) != r) { val t = uf(c); uf(c) = r; c = t }
    r
  }

  def roots: Seq[Int] = (0 until n).filter(x => uf(x) == x)

  /** Cost of the optimal flat encoding between roots a and b (Eq. (11) terms). */
  def pairCost(a: Int, b: Int): Long = {
    val e = if (a == b) cnt(a).getOrElse(a, 0) else cnt(a).getOrElse(b, 0)
    if (e == 0) return 0L
    val t = if (a == b) sizeOf(a).toLong * (sizeOf(a) - 1) / 2 else sizeOf(a).toLong * sizeOf(b)
    math.min(e.toLong, 1L + t - e)
  }

  /** Navlakha cost of a root: pair costs + its share of |H*|. */
  def rootCost(a: Int): Long = {
    var s = if (sizeOf(a) >= 2) sizeOf(a).toLong else 0L
    s += pairCost(a, a)
    cnt(a).keysIterator.foreach(c => if (c != a) s += pairCost(a, c))
    s
  }

  /** Cost of a hypothetical merged root a∪b (no mutation). */
  def mergedCost(a: Int, b: Int): Long = {
    val size = sizeOf(a) + sizeOf(b)
    var s = size.toLong // merged supernode always has >= 2 members
    val eSelf = cnt(a).getOrElse(a, 0) + cnt(b).getOrElse(b, 0) + cnt(a).getOrElse(b, 0)
    if (eSelf > 0) {
      val t = size.toLong * (size - 1) / 2
      s += math.min(eSelf.toLong, 1L + t - eSelf)
    }
    val nbrs = (cnt(a).keysIterator ++ cnt(b).keysIterator).filter(c => c != a && c != b).toSet
    nbrs.foreach { c =>
      val e = cnt(a).getOrElse(c, 0) + cnt(b).getOrElse(c, 0)
      if (e > 0) {
        val t = size.toLong * sizeOf(c)
        s += math.min(e.toLong, 1L + t - e)
      }
    }
    s
  }

  /** Navlakha's merge gain s(u,v) = (cu + cv - cuv) / (cu + cv). */
  def gain(a: Int, b: Int): Double = {
    val ca = rootCost(a); val cb = rootCost(b)
    val shared = pairCost(a, b)
    val before = ca + cb - shared
    if (before <= 0) return Double.NegativeInfinity
    (before - mergedCost(a, b)).toDouble / before
  }

  /** Merge roots a and b; returns the surviving root id. */
  def merge(a: Int, b: Int): Int = {
    val (w, l) = if (cnt(a).size >= cnt(b).size) (a, b) else (b, a)
    uf(l) = w
    val cw = cnt(w); val cl = cnt.remove(l).get
    // fold l's self count and the w-l cross count into w's self count
    val self = cw.getOrElse(w, 0) + cl.getOrElse(l, 0) + cw.getOrElse(l, 0)
    cw.remove(l); cl.remove(w); cl.remove(l)
    if (self > 0) cw(w) = self
    cl.foreach { case (c, k) =>
      cw(c) = cw.getOrElse(c, 0) + k
      val cc = cnt(c)
      cc.remove(l)
      cc(w) = cc.getOrElse(w, 0) + k
    }
    sizeOf(w) = sizeOf(w) + sizeOf.remove(l).get
    w
  }

  def superOf: Array[Int] = Array.tabulate(n)(find)
}
