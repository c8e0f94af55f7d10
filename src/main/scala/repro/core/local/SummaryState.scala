package repro.core.local

import repro.core.encode.Enc
import repro.core.model.HierSummary
import repro.graph.LocalGraph
import scala.collection.mutable

/** Mutable working state of SLUGGER's merge phase.
  *
  * Supernode ids: 0..nSub-1 are singleton leaves; every merge appends a new
  * id. During the merge phase the hierarchy is a binary forest (each merge
  * creates a parent with exactly two children); pruning may later splice
  * children upward.
  *
  * Edges are stored with provenance so panels can be reassembled cheaply:
  *  - `internal(root)`  — p/n-edges with both endpoints inside the root's
  *    family (placed by Case 1 rewrites at any depth),
  *  - `pairs(rootA)(rootB)` — p/n-edges between the two families. The buffer
  *    is shared by both entries, so membership updates are O(1).
  *
  * Root identity under merges is tracked with a union-find over the merge
  * lineage: `find(x)` is the current root of the tree containing supernode x
  * (and of subnode x, since singletons start as their own roots).
  */
final class SummaryState(val g: LocalGraph) extends MergeSubstrate {
  val nSub: Int = g.n

  // ------------------------------------------------------- per-super arrays
  private val parentB = mutable.ArrayBuffer.empty[Int] // hierarchy parent (H)
  private val child1B = mutable.ArrayBuffer.empty[Int]
  private val child2B = mutable.ArrayBuffer.empty[Int]
  private val heightB = mutable.ArrayBuffer.empty[Int]
  private val ufB     = mutable.ArrayBuffer.empty[Int] // merge-lineage union-find

  // --------------------------------------------------------- per-root state
  val famSize   = mutable.HashMap.empty[Int, Int]  // #supernodes in the tree
  val szSub     = mutable.HashMap.empty[Int, Int]  // #subnodes in the tree
  val internal  = mutable.HashMap.empty[Int, mutable.ArrayBuffer[Enc]]
  val pairs     = mutable.HashMap.empty[Int, mutable.HashMap[Int, mutable.ArrayBuffer[Enc]]]
  val subCnt    = mutable.HashMap.empty[Int, mutable.HashMap[Int, Int]] // ground-truth subedge counts
  val pairTotal = mutable.HashMap.empty[Int, Int]  // Σ |pairs(root)(·)|

  // ------------------------------------------------------------------- init
  (0 until nSub).foreach { u =>
    parentB += -1; child1B += -1; child2B += -1; heightB += 0; ufB += u
    famSize(u) = 1; szSub(u) = 1
    internal(u) = mutable.ArrayBuffer.empty
    pairs(u) = mutable.HashMap.empty
    subCnt(u) = mutable.HashMap.empty
    pairTotal(u) = 0
  }
  g.edges.foreach { case (u, v) =>
    val buf = mutable.ArrayBuffer(Enc(u, v, +1))
    pairs(u)(v) = buf; pairs(v)(u) = buf
    subCnt(u)(v) = 1; subCnt(v)(u) = 1
    pairTotal(u) += 1; pairTotal(v) += 1
  }

  def nSupers: Int = parentB.length
  def parentOf(x: Int): Int = parentB(x)
  def heightOf(x: Int): Int = heightB(x)
  def isRoot(x: Int): Boolean = parentB(x) == -1
  def isLeafSuper(x: Int): Boolean = x < nSub
  def childrenOf(x: Int): Seq[Int] =
    if (child1B(x) < 0) Nil else Seq(child1B(x), child2B(x))

  /** Current root of the tree containing super/subnode x. */
  def find(x: Int): Int = {
    var r = x
    while (ufB(r) != r) r = ufB(r)
    var c = x
    while (ufB(c) != r) { val nxt = ufB(c); ufB(c) = r; c = nxt }
    r
  }

  /** Allocate the merged supernode for roots a and b (caller wires state). */
  def newSuper(a: Int, b: Int): Int = {
    val m = parentB.length
    parentB += -1; child1B += a; child2B += b
    heightB += math.max(heightB(a), heightB(b)) + 1
    ufB += m
    parentB(a) = m; parentB(b) = m
    ufB(a) = m; ufB(b) = m
    m
  }

  /** Total current cost |P+|+|P-|+|H| (pre-pruning; every non-root has one h-edge). */
  def totalCost: Long = {
    var internalSum = 0L
    internal.valuesIterator.foreach(internalSum += _.length)
    var pairSum = 0L // each pair buffer is registered under both roots: halve
    pairs.valuesIterator.foreach(m => m.valuesIterator.foreach(pairSum += _.length))
    val h = (0 until nSupers).count(parentB(_) >= 0).toLong
    internalSum + pairSum / 2 + h
  }

  /** All current p/n edges, each exactly once. */
  def allEdges: Iterator[Enc] = {
    val own = pairs.iterator.flatMap { case (a, m) =>
      m.iterator.collect { case (c, buf) if a < c => buf }
    }
    internal.valuesIterator.flatMap(_.iterator) ++ own.flatten
  }

  /** Snapshot as an (unpruned) HierSummary — used by tests to verify
    * losslessness at any point of the merge phase.
    */
  def toSummary: HierSummary = {
    val pp = mutable.ArrayBuffer.empty[(Int, Int)]
    val pm = mutable.ArrayBuffer.empty[(Int, Int)]
    allEdges.foreach(e => if (e.sign > 0) pp += ((e.x, e.y)) else pm += ((e.x, e.y)))
    HierSummary(nSub, parentB.toArray, Array.fill(parentB.length)(true), pp.toSeq, pm.toSeq)
  }
}
