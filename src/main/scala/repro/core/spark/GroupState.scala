package repro.core.spark

import repro.core.encode.Enc
import repro.core.local.{MergeEngine, MergeSubstrate}
import scala.collection.mutable
import scala.util.Random

/** Serializable snapshot of everything one candidate set needs to run the
  * merging step on an executor: the group's roots (hierarchy tops, internal
  * encodings), all pair encodings incident to them, ground-truth subedge
  * counts, and the 1-level families of neighbor roots (for Case 2 panels).
  */
final case class GroupTask(
    groupKey: Long,
    nSub: Int,
    idBase: Int,                                 // temp id range for in-task merges
    roots: Seq[RootInfo],
    neighborChildren: Map[Int, Seq[Int]],        // foreign root -> direct children
    pairEncs: Seq[(Int, Int, Seq[Enc])],         // (rootA-in-group, otherRoot, edges)
    subCnts: Seq[(Int, Int, Int)],               // (rootA-in-group, otherRoot, count)
    theta: Double,
    heightBound: Int,
    rngSeed: Long,
)

final case class RootInfo(id: Int, famSize: Int, szSub: Int, height: Int,
                          children: Seq[Int], internalEdges: Seq[Enc])

/** The merge decisions an executor made for one group, in order. The k-th
  * merge creates temp id `idBase + k`; the driver replays them against the
  * global state, mapping temp ids to real ids as it goes.
  */
final case class GroupDecisions(groupKey: Long, merges: Seq[(Int, Int)])

/** Executor-side [[MergeSubstrate]] reconstructed from a [[GroupTask]].
  *
  * Neighbor (foreign) roots get stub entries so the shared [[MergeEngine]]
  * can update back-references; only group roots are ever merged here.
  */
final class GroupState(task: GroupTask) extends MergeSubstrate {
  val famSize   = mutable.HashMap.empty[Int, Int]
  val szSub     = mutable.HashMap.empty[Int, Int]
  val internal  = mutable.HashMap.empty[Int, mutable.ArrayBuffer[Enc]]
  val pairs     = mutable.HashMap.empty[Int, mutable.HashMap[Int, mutable.ArrayBuffer[Enc]]]
  val subCnt    = mutable.HashMap.empty[Int, mutable.HashMap[Int, Int]]
  val pairTotal = mutable.HashMap.empty[Int, Int]

  private val childrenMap = mutable.HashMap.empty[Int, Seq[Int]]
  private val heightMap = mutable.HashMap.empty[Int, Int]
  private val parentMap = mutable.HashMap.empty[Int, Int] // for isRoot among tracked ids
  private val uf = mutable.HashMap.empty[Int, Int]
  private var nextId = task.idBase

  task.roots.foreach { r =>
    famSize(r.id) = r.famSize; szSub(r.id) = r.szSub
    internal(r.id) = mutable.ArrayBuffer.from(r.internalEdges)
    childrenMap(r.id) = r.children
    heightMap(r.id) = r.height
    pairs(r.id) = mutable.HashMap.empty
    subCnt(r.id) = mutable.HashMap.empty
    pairTotal(r.id) = 0
  }
  task.neighborChildren.foreach { case (c, ch) => childrenMap.getOrElseUpdate(c, ch) }
  task.pairEncs.foreach { case (a, c, es) =>
    val buf = mutable.ArrayBuffer.from(es)
    pairs(a)(c) = buf
    pairs.getOrElseUpdate(c, mutable.HashMap.empty)(a) = buf
    pairTotal(a) = pairTotal(a) + buf.length
    pairTotal(c) = pairTotal.getOrElse(c, 0) + buf.length
  }
  task.subCnts.foreach { case (a, c, n) =>
    subCnt(a)(c) = n
    subCnt.getOrElseUpdate(c, mutable.HashMap.empty)(a) = n
  }

  def isRoot(x: Int): Boolean = !parentMap.contains(x)
  def isLeafSuper(x: Int): Boolean = x < task.nSub
  def childrenOf(x: Int): Seq[Int] = childrenMap.getOrElse(x, Nil)
  def heightOf(x: Int): Int = heightMap.getOrElse(x, 0)

  def find(x: Int): Int = {
    var r = x
    while (uf.contains(r)) r = uf(r)
    r
  }

  def newSuper(a: Int, b: Int): Int = {
    val m = nextId
    nextId += 1
    childrenMap(m) = Seq(a, b)
    heightMap(m) = math.max(heightOf(a), heightOf(b)) + 1
    parentMap(a) = m; parentMap(b) = m
    uf(a) = m; uf(b) = m
    m
  }
}

object GroupState {

  /** Run Algorithm 2 for one task, recording the merge decisions. */
  def run(task: GroupTask): GroupDecisions = {
    val gs = new GroupState(task)
    val decisions = mutable.ArrayBuffer.empty[(Int, Int)]
    val engine = new MergeEngine(gs)
    val rng = new Random(task.rngSeed)
    val q = mutable.ArrayBuffer.from(task.roots.map(_.id))
    while (q.length > 1) {
      val a = q.remove(rng.nextInt(q.length))
      if (gs.isRoot(a)) {
        var bestZ = -1
        var bestS = Double.NegativeInfinity
        var i = 0
        while (i < q.length) {
          val z = q(i)
          if (gs.isRoot(z) && z != a &&
              math.max(gs.heightOf(a), gs.heightOf(z)) + 1 <= task.heightBound &&
              engine.closeEnough(a, z)) {
            val s = engine.saving(a, z)
            if (s > bestS) { bestS = s; bestZ = z }
          }
          i += 1
        }
        if (bestZ >= 0 && bestS >= task.theta) {
          decisions += ((a, bestZ))
          val m = engine.merge(a, bestZ)
          q -= bestZ
          q += m
        }
      }
    }
    GroupDecisions(task.groupKey, decisions.toSeq)
  }
}
