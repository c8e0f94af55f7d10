package repro.core.encode

import scala.collection.mutable

/** A p/n edge of the summary, canonical with x <= y; sign is +1 (p) or -1 (n). */
final case class Enc(x: Int, y: Int, sign: Int)

/** Minimum signed edge cover with memoization — the engine behind SLUGGER's
  * Case 1 / Case 2 encoding updates (paper §III-B3).
  *
  * A *panel* is the bounded set of supernodes whose incident p/n-edges may
  * be rewritten when two root nodes merge: up to 7 supernodes for Case 1
  * (the merged node, its two children, and their children) and 7 x 3 for
  * Case 2 (that panel vs a neighbor root's 1-level family). The *blocks* are
  * the finest panel level; by exactness of the current encoding, the net
  * p-minus-n count is uniform over every block pair, so a rewrite is valid
  * iff it reproduces the old net on every block pair (and the old self-loop
  * sum inside every non-singleton block). The search therefore minimizes the
  * number of signed edges hitting an integer target vector.
  *
  * Results are memoized on (panel shape, targets): the table is independent
  * of the input graph, exactly as the paper observes, and is shared across
  * graphs and runs.
  */
object MinCover {

  /** One rewrite option: which slots to use with which sign. */
  final case class Solution(cost: Int, picks: List[(Int, Int)])

  private final case class Key(shape: Int, targets: List[Int])

  private val memo = new java.util.concurrent.ConcurrentHashMap[Key, Solution]()

  /** Number of distinct memoized cases so far (for the memoization bench). */
  def memoSize: Int = memo.size
  def memoClear(): Unit = memo.clear()

  /** Search depth cap beyond which we fall back to reproducing the old
    * encoding verbatim (still valid, never worse than keep-old).
    */
  private val MaxDepth = 5

  /** Per-key budget of DFS nodes; pathological keys fall back to keep-old.
    * Keeps the one-time memoization fill bounded (the paper reports < 2 s).
    */
  private val NodeBudget = 200000

  /** Solve min-cost signed cover.
    *
    * @param shape     canonical id of the slot structure (drives the memo key)
    * @param covers    per slot, bitmask over constraint indices it covers
    * @param targets   required net per constraint
    * @param reproduce a known-feasible assignment (slotIdx, sign) reproducing
    *                  `targets` — the old encoding mapped onto slots
    */
  def solve(shape: Int, covers: Array[Long], targets: Array[Int],
            reproduce: List[(Int, Int)]): Solution = {
    val key = Key(shape, targets.toList)
    val hit = memo.get(key)
    if (hit != null) return hit
    val sol = search(covers, targets, reproduce)
    memo.put(key, sol)
    sol
  }

  private def search(covers: Array[Long], targets: Array[Int],
                     reproduce: List[(Int, Int)]): Solution = {
    val nCons = targets.length
    val ub = reproduce.size
    if (targets.forall(_ == 0)) return Solution(0, Nil)
    val maxCov = if (covers.isEmpty) 1 else covers.map(java.lang.Long.bitCount).max.max(1)
    // Slots covering each constraint, widest coverage first (coarse-first
    // tie-break: prefer edges high in the hierarchy, which keeps future
    // panels rewritable — the paper's "choose considering the next step").
    val byCons = Array.tabulate(nCons) { c =>
      covers.indices.filter(s => (covers(s) >> c & 1L) == 1L)
        .sortBy(s => -java.lang.Long.bitCount(covers(s))).toArray
    }
    val res = targets.clone()
    val used = new Array[Boolean](covers.length)
    val picks = mutable.ListBuffer.empty[(Int, Int)]
    var best: List[(Int, Int)] = null
    var budget = NodeBudget

    def lowerBound: Int = {
      var maxAbs = 0; var sum = 0
      var c = 0
      while (c < nCons) { val a = math.abs(res(c)); if (a > maxAbs) maxAbs = a; sum += a; c += 1 }
      math.max(maxAbs, (sum + maxCov - 1) / maxCov)
    }

    def dfs(depth: Int, limit: Int): Boolean = {
      var c = 0
      while (c < nCons && res(c) == 0) c += 1
      if (c == nCons) { best = picks.toList; return true }
      budget -= 1
      if (budget <= 0 || depth >= limit || depth + lowerBound > limit) return false
      val slots = byCons(c)
      val prefer = if (res(c) > 0) 1 else -1
      var i = 0
      while (i < slots.length) {
        val s = slots(i)
        if (!used(s)) {
          var k = 0
          while (k < 2) {
            val sign = if (k == 0) prefer else -prefer
            used(s) = true; picks += ((s, sign))
            var cc = 0
            while (cc < nCons) { if ((covers(s) >> cc & 1L) == 1L) res(cc) -= sign; cc += 1 }
            if (dfs(depth + 1, limit)) return true
            cc = 0
            while (cc < nCons) { if ((covers(s) >> cc & 1L) == 1L) res(cc) += sign; cc += 1 }
            picks.remove(picks.length - 1); used(s) = false
            k += 1
          }
        }
        i += 1
      }
      false
    }

    var limit = lowerBound
    val cap = math.min(ub, MaxDepth + 1) // depth `ub` would just re-find reproduce
    while (limit < cap && budget > 0) {
      if (dfs(0, limit)) return Solution(best.size, best)
      limit += 1
    }
    Solution(ub, reproduce)
  }
}

/** A Case 1 or Case 2 panel: symbols, blocks, constraints, slots.
  *
  * Symbols are small indices over the concrete supernode ids involved. The
  * caller maps old edges into symbol pairs; an edge with an endpoint outside
  * the panel is *deep* and stays fixed — the paper's "while fixing the other
  * p-edges and n-edges". Deep edges never cross a block pair that the panel
  * rewrites (they sit strictly inside a single block, or their block-pair
  * target already accounts for them via the old panel net).
  *
  * `crossOnly` marks a Case 2 panel: only pairs between the two families are
  * constrained and only family-crossing edges may be placed.
  */
final class Panel private (
    val symIds: Array[Int],          // actual super ids per symbol (symbol 0 = merged node M, may be -1 when tentative)
    val symParent: Array[Int],       // panel-internal parent symbol or -1
    val symSide: Array[Int],         // 0 = merged family, 1 = neighbor family
    val blocks: Array[Int],          // symbols forming the finest level
    val blockSingleton: Array[Boolean],
    val crossOnly: Boolean,
    val shape: Int,
) {
  val nSym: Int = symIds.length
  private val idToSym: Map[Int, Int] =
    symIds.zipWithIndex.collect { case (id, s) if id >= 0 => id -> s }.toMap

  /** Symbol of a concrete super id, or -1 if outside the panel (deep). */
  def symOf(id: Int): Int = idToSym.getOrElse(id, -1)

  private def containsSym(anc: Int, sym: Int): Boolean = {
    var s = sym
    while (s >= 0) { if (s == anc) return true; s = symParent(s) }
    false
  }

  /** Constraint layout: constrained unordered block pairs first, then
    * self-loop sums for non-singleton blocks (Case 1 only).
    */
  val crossPairs: Array[(Int, Int)] =
    (for {
      i <- blocks.indices; j <- i + 1 until blocks.length
      if !crossOnly || symSide(blocks(i)) != symSide(blocks(j))
    } yield (i, j)).toArray
  val sumBlocks: Array[Int] =
    if (crossOnly) Array.empty else blocks.indices.filter(i => !blockSingleton(i)).toArray
  val nCons: Int = crossPairs.length + sumBlocks.length

  /** Coverage bitmask of an edge between panel symbols (x may equal y: loop). */
  def coverOf(sx: Int, sy: Int): Long = {
    var mask = 0L
    var k = 0
    while (k < crossPairs.length) {
      val (i, j) = crossPairs(k)
      val bi = blocks(i); val bj = blocks(j)
      val cov =
        if (sx == sy) containsSym(sx, bi) && containsSym(sx, bj)
        else (containsSym(sx, bi) && containsSym(sy, bj)) ||
             (containsSym(sy, bi) && containsSym(sx, bj))
      if (cov) mask |= 1L << k
      k += 1
    }
    var q = 0
    while (q < sumBlocks.length) {
      if (sx == sy && containsSym(sx, blocks(sumBlocks(q)))) mask |= 1L << (crossPairs.length + q)
      q += 1
    }
    mask
  }

  /** Candidate positions for new edges: never between nested symbols, never
    * same-family in a Case 2 panel, never with empty coverage. Order is
    * deterministic given the shape.
    */
  val slots: Array[(Int, Int)] = {
    val out = mutable.ArrayBuffer.empty[(Int, Int)]
    if (!crossOnly) for (s <- 0 until nSym) if (coverOf(s, s) != 0L) out += ((s, s))
    for (a <- 0 until nSym; b <- a + 1 until nSym) {
      val ok = !containsSym(a, b) && !containsSym(b, a) &&
        (!crossOnly || symSide(a) != symSide(b)) && coverOf(a, b) != 0L
      if (ok) out += ((a, b))
    }
    out.toArray
  }
  val slotCovers: Array[Long] = slots.map { case (a, b) => coverOf(a, b) }
  private val slotIndex: Map[(Int, Int), Int] =
    slots.zipWithIndex.map { case (ab, i) => ab -> i }.toMap

  def slotOf(sx: Int, sy: Int): Int =
    slotIndex.getOrElse(if (sx <= sy) (sx, sy) else (sy, sx), -1)
}

object Panel {

  /** Case 1 panel for merging roots A and B into M.
    *
    * Symbols: 0=M, 1=A, 2=B, then A's children, then B's children.
    * Blocks: A's children (or A itself if a leaf) ++ B's likewise.
    */
  def internal(aChildren: Seq[Int], bChildren: Seq[Int],
               aId: Int, bId: Int, mId: Int,
               isLeafSuper: Int => Boolean): Panel = {
    val syms = mutable.ArrayBuffer[Int](mId, aId, bId)
    val par = mutable.ArrayBuffer[Int](-1, 0, 0)
    val blocks = mutable.ArrayBuffer.empty[Int]
    val single = mutable.ArrayBuffer.empty[Boolean]
    def addSide(pSym: Int, ch: Seq[Int], selfId: Int): Unit = {
      if (ch.isEmpty) { blocks += pSym; single += isLeafSuper(selfId) }
      else ch.foreach { c =>
        syms += c; par += pSym
        blocks += (syms.length - 1); single += isLeafSuper(c)
      }
    }
    addSide(1, aChildren, aId)
    addSide(2, bChildren, bId)
    val singleMask = single.zipWithIndex.map { case (s, i) => if (s) 1 << i else 0 }.sum
    val shape = 1 << 20 | aChildren.length << 8 | bChildren.length << 4 | singleMask
    new Panel(syms.toArray, par.toArray, Array.fill(syms.length)(0),
              blocks.toArray, single.toArray, crossOnly = false, shape)
  }

  /** Case 2 panel: the merged family {M, A, B, ch(A), ch(B)} versus a
    * neighbor root C's 1-level family {C, ch(C)}.
    */
  def cross(aChildren: Seq[Int], bChildren: Seq[Int], aId: Int, bId: Int, mId: Int,
            cId: Int, cChildren: Seq[Int]): Panel = {
    val syms = mutable.ArrayBuffer[Int](mId, aId, bId)
    val par = mutable.ArrayBuffer[Int](-1, 0, 0)
    val side = mutable.ArrayBuffer[Int](0, 0, 0)
    val blocks = mutable.ArrayBuffer.empty[Int]
    def addLeft(pSym: Int, ch: Seq[Int]): Unit = {
      if (ch.isEmpty) blocks += pSym
      else ch.foreach { c => syms += c; par += pSym; side += 0; blocks += (syms.length - 1) }
    }
    addLeft(1, aChildren)
    addLeft(2, bChildren)
    val cSym = syms.length
    syms += cId; par += -1; side += 1
    if (cChildren.isEmpty) blocks += cSym
    else cChildren.foreach { c => syms += c; par += cSym; side += 1; blocks += (syms.length - 1) }
    val single = Array.fill(blocks.length)(true) // no within-block constraints cross-family
    val shape = 2 << 20 | aChildren.length << 8 | bChildren.length << 4 | cChildren.length
    new Panel(syms.toArray, par.toArray, side.toArray, blocks.toArray, single,
              crossOnly = true, shape)
  }
}
