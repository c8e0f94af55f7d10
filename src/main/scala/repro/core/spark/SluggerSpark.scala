package repro.core.spark

import org.apache.spark.sql.{DataFrame, Encoders, SparkSession}
import repro.core.local.{MergeEngine, Metrics, Pruner, Slugger, SummaryState}
import repro.core.model.HierSummary
import repro.graph.LocalGraph
import scala.collection.mutable

/** Distributed SLUGGER.
  *
  * The paper's reference implementation is single-machine; this variant maps
  * it onto Spark dataflow:
  *   - candidate generation runs as Catalyst plans over the edge and
  *     membership DataFrames ([[CandidateGenSpark]]),
  *   - the merging step — by far the dominant cost, Lemma 3 — fans out as a
  *     Dataset of [[GroupTask]]s, one per candidate set, searched in parallel
  *     on executors with the exact same [[MergeEngine]] as the local mode,
  *   - the resulting merge decisions are replayed into the authoritative
  *     driver-held state (cheap: one commit per accepted merge), keeping the
  *     encoding globally consistent without cross-group write conflicts,
  *   - decompression/verification runs as DataFrame joins
  *     ([[HierSummary.decompressDF]]).
  *
  * Candidate sets partition the roots, so decisions from different groups
  * never merge the same root; replay order only affects which Case-2 rewrite
  * sees which neighbor state first, exactly as in the sequential algorithm.
  */
object SluggerSpark {

  def summarize(spark: SparkSession, edges: DataFrame,
                cfg: Slugger.Config = Slugger.Config()): Slugger.Result = {
    val g = LocalGraph.fromDF(edges)
    val edgesDense = LocalGraph.toDF(spark, g).cache()
    edgesDense.count()

    val st = new SummaryState(g)
    val engine = new MergeEngine(st)
    // Java serialization: kryo's reflective field access trips JPMS module
    // boundaries on JDK 17+ without --add-opens, which spark-submit sets but
    // a plain forked test JVM does not.
    implicit val taskEnc = Encoders.javaSerialization[GroupTask]
    implicit val decEnc = Encoders.javaSerialization[GroupDecisions]
    import spark.implicits._

    val t0 = System.nanoTime()
    var totalMerges = 0L
    var t = 1
    while (t <= cfg.T) {
      val rootIds = (0 until g.n).map(st.find)
      val members = (0 until g.n).map(u => (u, rootIds(u))).toDF("sub", "root")
      val assigned = CandidateGenSpark.assign(spark, edgesDense, members,
        cfg.seed + 7919L * t, cfg.maxGroupSize, rootIds.distinct.size.toLong)
        .collect().map(r => (r.getInt(0), r.getLong(1)))
      val byGroup = assigned.groupBy(_._2).view.mapValues(_.map(_._1).toSeq).toMap
        .filter(_._2.lengthCompare(2) >= 0)

      val theta = engine.theta(t, cfg.T)
      val tasks = byGroup.iterator.map { case (key, roots) =>
        buildTask(st, key, roots, theta, cfg.heightBound, cfg.seed * 31 + t)
      }.toSeq

      val decisions = spark.createDataset(tasks)
        .map(GroupState.run _)
        .collect()

      // replay decisions against the authoritative state, mapping the
      // executors' temp ids (>= idBase = nSupers at task build time) to the
      // real ids allocated here
      val baseByKey = tasks.iterator.map(tk => tk.groupKey -> tk.idBase).toMap
      decisions.foreach { d =>
        val idBase = baseByKey.getOrElse(d.groupKey, Int.MaxValue)
        val tempMap = mutable.HashMap.empty[Int, Int]
        var k = 0
        d.merges.foreach { case (a0, b0) =>
          val a = st.find(tempMap.getOrElse(a0, a0))
          val b = st.find(tempMap.getOrElse(b0, b0))
          if (a != b && st.isRoot(a) && st.isRoot(b)) {
            val m = engine.merge(a, b)
            tempMap(idBase + k) = m
            totalMerges += 1
          }
          k += 1
        }
      }
      t += 1
    }
    val t1 = System.nanoTime()
    val ps = Pruner.fromState(st)
    val snaps = mutable.ArrayBuffer.empty[(String, Metrics)]
    Pruner.prune(ps, g, cfg.pruneRounds, (label, met) => snaps += ((label, met)))
    val t2 = System.nanoTime()
    edgesDense.unpersist()
    Slugger.Result(ps.toSummary, snaps.toSeq, (t1 - t0) / 1000000, (t2 - t1) / 1000000, totalMerges)
  }

  /** Snapshot everything one candidate set needs (see [[GroupTask]]). */
  private def buildTask(st: SummaryState, key: Long, rootIds: Seq[Int],
                        theta: Double, heightBound: Int, rngSeed: Long): GroupTask = {
    val live = rootIds.map(st.find).distinct.filter(st.isRoot)
    val inGroup = live.toSet
    val roots = live.map { r =>
      RootInfo(r, st.famSize(r), st.szSub(r), st.heightOf(r),
               st.childrenOf(r), st.internal(r).toSeq)
    }
    val pairEncs = mutable.ArrayBuffer.empty[(Int, Int, Seq[repro.core.encode.Enc])]
    val nbrChildren = mutable.HashMap.empty[Int, Seq[Int]]
    val subCnts = mutable.ArrayBuffer.empty[(Int, Int, Int)]
    live.foreach { a =>
      st.pairs(a).foreach { case (c, buf) =>
        // take in-group pairs once (from the smaller id), foreign pairs always
        if (!inGroup.contains(c) || a < c) pairEncs += ((a, c, buf.toSeq))
        if (!inGroup.contains(c)) nbrChildren.getOrElseUpdate(c, st.childrenOf(c))
      }
      st.subCnt(a).foreach { case (c, n) =>
        if (!inGroup.contains(c) || a < c) subCnts += ((a, c, n))
      }
    }
    GroupTask(key, st.nSub, st.nSupers, roots, nbrChildren.toMap,
              pairEncs.toSeq, subCnts.toSeq, theta, heightBound, rngSeed)
  }
}
