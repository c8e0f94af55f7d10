package repro.core.local

import repro.core.model.HierSummary
import repro.graph.LocalGraph
import scala.util.Random

/** SLUGGER (Algorithm 1): scalable lossless hierarchical graph summarization.
  *
  * Initializes the summary to the input graph, then alternates candidate
  * generation and greedy merging for T iterations, and finally prunes
  * supernodes that do not contribute to a succinct encoding.
  */
object Slugger {

  /** @param T            number of candidate-generation + merging iterations
    * @param seed         RNG seed (shingles, processing order)
    * @param maxGroupSize candidate-set size cap (paper: 500)
    * @param heightBound  H_b variant of Table V (Int.MaxValue = unbounded)
    * @param pruneRounds  extra pruning rounds after the measured first pass
    */
  final case class Config(T: Int = 20, seed: Long = 42, maxGroupSize: Int = 500,
                          heightBound: Int = Int.MaxValue, pruneRounds: Int = 2)

  /** @param summary     final pruned model
    * @param snapshots   Table IV states: metrics after pruning substeps 0..3
    * @param mergeMillis merge-phase wall time
    * @param pruneMillis prune-phase wall time
    */
  final case class Result(summary: HierSummary, snapshots: Seq[(String, Metrics)],
                          mergeMillis: Long, pruneMillis: Long, totalMerges: Long) {
    def metrics(m: Long): Metrics = Metrics(
      summary.cost.toDouble / m, summary.maxHeight, summary.avgLeafDepth,
      summary.pPlus.size.toLong, summary.pMinus.size.toLong, summary.hEdgeCount)
  }

  def summarize(g: LocalGraph, cfg: Config = Config()): Result = {
    val st = new SummaryState(g)
    val engine = new MergeEngine(st)
    val t0 = System.nanoTime()
    var merges = 0L
    var t = 1
    while (t <= cfg.T) {
      val groups = CandidateGen.groups(st, cfg.seed + 7919L * t, cfg.maxGroupSize)
      val th = engine.theta(t, cfg.T)
      val rng = new Random(cfg.seed * 31 + t)
      groups.foreach(d => merges += engine.processGroup(d, th, rng, cfg.heightBound))
      t += 1
    }
    val t1 = System.nanoTime()
    val ps = Pruner.fromState(st)
    val snaps = scala.collection.mutable.ArrayBuffer.empty[(String, Metrics)]
    Pruner.prune(ps, g, cfg.pruneRounds, (label, met) => snaps += ((label, met)))
    val t2 = System.nanoTime()
    Result(ps.toSummary, snaps.toSeq, (t1 - t0) / 1000000, (t2 - t1) / 1000000, merges)
  }
}
