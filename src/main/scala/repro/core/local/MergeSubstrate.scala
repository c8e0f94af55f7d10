package repro.core.local

import repro.core.encode.Enc
import scala.collection.mutable

/** State surface required by [[MergeEngine]].
  *
  * Implemented by the full [[SummaryState]] (local mode) and by
  * [[repro.core.spark.GroupState]] (executor-side view of one candidate set
  * in the distributed mode).
  */
trait MergeSubstrate {
  def famSize: mutable.HashMap[Int, Int]
  def szSub: mutable.HashMap[Int, Int]
  def internal: mutable.HashMap[Int, mutable.ArrayBuffer[Enc]]
  def pairs: mutable.HashMap[Int, mutable.HashMap[Int, mutable.ArrayBuffer[Enc]]]
  def subCnt: mutable.HashMap[Int, mutable.HashMap[Int, Int]]
  def pairTotal: mutable.HashMap[Int, Int]

  def isRoot(x: Int): Boolean
  def isLeafSuper(x: Int): Boolean
  def childrenOf(x: Int): Seq[Int]
  def heightOf(x: Int): Int
  def find(x: Int): Int

  /** Allocate the merged supernode for roots a and b and wire hierarchy. */
  def newSuper(a: Int, b: Int): Int

  /** Encoding cost attributed to root A, Eq. (6). */
  def rootCost(a: Int): Int =
    (famSize(a) - 1) + internal(a).length + pairTotal(a)
}
