package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.local.{MergeEngine, SummaryState}
import repro.graph.LocalGraph
import scala.util.Random

/** Saving function, thresholds, Lemma 1 and commit bookkeeping. */
class MergeEngineSpec extends AnyFunSuite {

  def path(n: Int): LocalGraph =
    LocalGraph.fromEdges((0 until n - 1).map(i => (i.toLong, i.toLong + 1)))

  test("theta follows Eq. (9)") {
    val e = new MergeEngine(new SummaryState(path(3)))
    assert(e.theta(1, 20) == 0.5)
    assert(e.theta(4, 20) == 0.2)
    assert(e.theta(20, 20) == 0.0)
    assert(e.theta(19, 20) == 1.0 / 20)
  }

  test("Lemma 1: merging roots at distance >= 3 always increases the cost") {
    // path 0-1-2-3-4-5: nodes 0 and 4 are at distance 4
    val g = path(6)
    val st = new SummaryState(g)
    val e = new MergeEngine(st)
    assert(!e.closeEnough(0, 4))
    assert(!e.closeEnough(0, 3))
    val before = st.rootCost(0) + st.rootCost(4)
    assert(e.afterCost(0, 4) == before + 2, "Eq. (18): after = before + 2")
    assert(e.saving(0, 4) < 0)
  }

  test("closeEnough accepts adjacent roots and distance-2 roots") {
    val g = path(4)
    val e = new MergeEngine(new SummaryState(g))
    assert(e.closeEnough(0, 1)) // adjacent
    assert(e.closeEnough(0, 2)) // share neighbor 1
  }

  test("saving is symmetric") {
    val rng = new Random(3)
    val g = LocalGraph.fromEdges(Seq.fill(60)((rng.nextInt(20).toLong, rng.nextInt(20).toLong)))
    val e = new MergeEngine(new SummaryState(g))
    for (a <- 0 until 8; b <- a + 1 until 8 if e.closeEnough(a, b)) {
      assert(math.abs(e.saving(a, b) - e.saving(b, a)) < 1e-12, s"($a,$b)")
    }
  }

  test("saving of twin nodes (identical neighborhoods) is high") {
    // 0 and 1 both connect to 2,3,4,5 — classic mergeable twins
    val g = LocalGraph.fromEdges(for (t <- 0 to 1; o <- 2 to 5) yield (t.toLong, o.toLong))
    val e = new MergeEngine(new SummaryState(g))
    // before: 8 edges; after: 2 h + 4 cross edges = 6 -> saving 0.25
    assert(math.abs(e.saving(0, 1) - 0.25) < 1e-9)
  }

  test("afterCost equals realized cost after commit") {
    val rng = new Random(11)
    val g = LocalGraph.fromEdges(Seq.fill(80)((rng.nextInt(25).toLong, rng.nextInt(25).toLong)))
    val st = new SummaryState(g)
    val e = new MergeEngine(st)
    val candidates = for {
      a <- 0 until 10; b <- a + 1 until 10
      if st.isRoot(a) && st.isRoot(b) && e.closeEnough(a, b)
    } yield (a, b)
    val (a, b) = candidates.head
    val predicted = e.afterCost(a, b)
    val m = e.merge(a, b)
    assert(st.rootCost(m).toLong == predicted,
      s"predicted $predicted vs actual ${st.rootCost(m)}")
  }

  test("commit keeps the model lossless and updates the union-find") {
    val g = LocalGraph.fromEdges(for (t <- 0 to 1; o <- 2 to 5) yield (t.toLong, o.toLong))
    val st = new SummaryState(g)
    val e = new MergeEngine(st)
    val m = e.merge(0, 1)
    assert(st.find(0) == m && st.find(1) == m)
    assert(st.isRoot(m) && !st.isRoot(0) && !st.isRoot(1))
    assert(st.famSize(m) == 3 && st.szSub(m) == 2)
    assert(st.toSummary.decompress == g.edgeSet)
  }

  test("merging twins then their neighbors keeps collapsing a bipartite core") {
    val g = LocalGraph.fromEdges(for (t <- 0 to 2; o <- 3 to 7) yield (t.toLong, o.toLong))
    val st = new SummaryState(g)
    val e = new MergeEngine(st)
    val mTop = e.merge(0, 1)
    val mTop2 = e.merge(mTop, 2)
    val mBot = e.merge(3, 4)
    val mBot2 = e.merge(mBot, 5)
    assert(st.toSummary.decompress == g.edgeSet)
    // the core should now be encoded by very few cross edges
    assert(st.pairs(st.find(mTop2))(st.find(mBot2)).length <= 2)
  }

  test("processGroup respects the height bound") {
    val g = LocalGraph.fromEdges(for (t <- 0 to 3; o <- 4 to 9) yield (t.toLong, o.toLong))
    val st = new SummaryState(g)
    val e = new MergeEngine(st)
    e.processGroup(0 until 10, th = 0.0, new Random(1), heightBound = 1)
    (0 until st.nSupers).foreach(x => assert(st.heightOf(x) <= 1))
    assert(st.toSummary.decompress == g.edgeSet)
  }

  test("processGroup with threshold 1 merges nothing") {
    val g = path(8)
    val st = new SummaryState(g)
    val e = new MergeEngine(st)
    val merges = e.processGroup(0 until 8, th = 1.01, new Random(1))
    assert(merges == 0)
    assert(st.nSupers == 8)
  }

  test("pair buffers stay shared between both root maps after merges") {
    val rng = new Random(5)
    val g = LocalGraph.fromEdges(Seq.fill(70)((rng.nextInt(22).toLong, rng.nextInt(22).toLong)))
    val st = new SummaryState(g)
    val e = new MergeEngine(st)
    e.processGroup(0 until g.n, th = 0.0, new Random(2))
    val roots = (0 until st.nSupers).filter(st.isRoot)
    roots.foreach { r =>
      st.pairs(r).foreach { case (c, buf) =>
        assert(st.pairs(c)(r) eq buf, s"pair ($r,$c) buffer not shared")
      }
    }
  }
}
