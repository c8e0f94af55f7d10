package repro.bench

import repro.SparkSpec

/** Table II — dataset statistics (paper corpus vs synthetic stand-ins). */
class TableIIBench extends SparkSpec {
  test("Table II: dataset statistics") {
    val rows = Tables.tableII(spark, Datasets.defaultScale)
    assert(rows.length == 16)
    // every stand-in is non-trivial
    rows.foreach(r => assert(r(5).toLong >= 100, s"${r.head} too small"))
  }
}

/** Table III — relative size vs the iteration count T. */
class TableIIIBench extends SparkSpec {
  test("Table III: compression improves and converges with T") {
    val measured = Tables.tableIII(spark, Datasets.defaultScale)
    assert(measured.size == 16)
    measured.foreach { case (name, sizes) =>
      // non-increasing in T up to small randomized jitter
      sizes.sliding(2).foreach { case Seq(a, b) =>
        assert(b <= a + 0.02, s"$name: relative size grew from $a to $b")
      }
      // T=80 close to converged: within 10% of T=40 (paper: converged by 40)
      assert(sizes(5) <= sizes(4) * 1.10 + 1e-9, s"$name not converging")
      // never worse than no compression
      assert(sizes.last <= 1.0 + 1e-9, s"$name relative size above 1")
    }
  }
}

/** Table IV — effectiveness of the pruning substeps. */
class TableIVBench extends SparkSpec {
  test("Table IV: every pruning substep is cost-non-increasing") {
    val measured = Tables.tableIV(spark, Datasets.defaultScale)
    assert(measured.size == 16)
    measured.foreach { case (name, snaps) =>
      assert(snaps.map(_._1) == Seq("0", "1", "2", "3"), s"$name snapshots")
      snaps.map(_._2.cost).sliding(2).foreach { case Seq(a, b) =>
        assert(b <= a, s"$name: pruning substep increased cost $a -> $b")
      }
      // pruning flattens hierarchies (paper: height drops sharply at step 1)
      assert(snaps.last._2.maxHeight <= snaps.head._2.maxHeight, s"$name heights")
      assert(snaps.last._2.avgLeafDepth <= snaps.head._2.avgLeafDepth + 1e-9, s"$name depths")
    }
  }
}

/** Table V — effect of the height bound H_b. */
class TableVBench extends SparkSpec {
  test("Table V: taller hierarchies buy smaller outputs") {
    val measured = Tables.tableV(spark, Datasets.defaultScale)
    assert(measured.size == 16)
    measured.foreach { case (name, perHb) =>
      val rels = perHb.map(_._2)
      // relative size non-increasing in H_b (small jitter allowed)
      rels.sliding(2).foreach { case Seq(a, b) =>
        assert(b <= a + 0.03, s"$name: rel size grew with H_b: $rels")
      }
      // the unbounded run must be at least as good as H_b = 2
      assert(rels.last <= rels.head + 1e-9, s"$name: unbounded worse than H_b=2")
      // depth never exceeds the bound
      perHb.zip(Tables.HbSweep).foreach { case ((depth, _), hb) =>
        if (hb != Int.MaxValue) assert(depth <= hb + 1e-9, s"$name depth $depth over H_b=$hb")
      }
    }
  }
}

/** Fig. 5 / Fig. 1(a) — compactness vs the four baselines, plus runtimes. */
class CompactnessBench extends SparkSpec {
  test("Fig. 5: SLUGGER gives the most concise representation") {
    val measured = Tables.compactness(spark, Datasets.defaultScale)
    assert(measured.size == 16)
    var wins = 0
    measured.foreach { case (name, (m, byAlgo)) =>
      val slugger = byAlgo("SLUGGER").summary.cost
      val best = byAlgo.collect { case (n, r) if n != "SLUGGER" => r.summary.cost }.min
      if (slugger <= best) wins += 1
      // SLUGGER never loses beyond randomized near-tie jitter (paper: always
      // the most concise; on single-level structure the hierarchical model
      // provably can only tie the flat one, so ties count as wins here)
      assert(slugger <= best * 1.02 + 2,
        s"$name: SLUGGER $slugger worse than best baseline $best")
    }
    assert(wins >= 10, s"SLUGGER should win or tie nearly everywhere, won $wins/16")
  }
}

/** Fig. 1(b) — linear scalability in |E|. */
class ScalabilityBench extends SparkSpec {
  test("Fig. 1(b): runtime grows roughly linearly with |E|") {
    val measured = Tables.scalability(spark)
    assert(measured.length >= 4)
    val (m0, t0) = measured.head
    val (m1, t1) = measured.last
    val sizeRatio = m1.toDouble / m0
    val timeRatio = t1.toDouble / math.max(1, t0)
    // allow generous slack over perfectly linear, but reject quadratic blowup
    assert(timeRatio <= sizeRatio * sizeRatio * 0.75 + 8,
      f"superlinear scaling: |E| x$sizeRatio%.1f but time x$timeRatio%.1f")
  }
}

/** Distributed SLUGGER at bench scale (validates the Spark dataflow path). */
class DistributedBench extends SparkSpec {
  test("distributed SLUGGER matches local compression on bench datasets") {
    import repro.core.local.Slugger
    import repro.core.spark.SluggerSpark
    import repro.graph.LocalGraph
    val rows = Seq("PR", "HO", "CA").map { name =>
      val spec = Datasets.byName(name)
      val edges = spec.gen(spark, Datasets.defaultScale).cache()
      val g = LocalGraph.fromDF(edges)
      val (local, lms) = Harness.timeIt(Slugger.summarize(g, Slugger.Config(T = 10)))
      val (dist, dms) = Harness.timeIt(SluggerSpark.summarize(spark, edges, Slugger.Config(T = 10)))
      assert(dist.summary.decompress == g.edgeSet, s"$name: distributed output lossy")
      val lRel = local.summary.relativeSize(g.m)
      val dRel = dist.summary.relativeSize(g.m)
      assert(dRel <= lRel * 1.3 + 0.02, s"$name: distributed $dRel vs local $lRel")
      edges.unpersist()
      Seq(name, g.m.toString, f"$lRel%.3f", f"$dRel%.3f", s"$lms", s"$dms")
    }
    Harness.report("distributed", "Distributed vs local SLUGGER (T=10)",
      Seq("Data", "#edges", "local rel", "distributed rel", "local ms", "distributed ms"), rows)
  }
}

/** Fig. 6 — composition of output edge types. */
class CompositionBench extends SparkSpec {
  test("Fig. 6: p-edges dominate, n-edges stay rare") {
    val measured = Tables.composition(spark, Datasets.defaultScale)
    assert(measured.size == 16)
    measured.foreach { case (name, (p, n, h)) =>
      assert(math.abs(p + n + h - 1.0) < 1e-9, s"$name proportions do not sum to 1")
      // paper: n-edges < 5.08% everywhere except PR (13.24%)
      assert(n <= 0.25, s"$name: n-edge share $n unreasonably large")
      assert(p + h >= 0.75, s"$name: p+h share too small")
    }
    val nDominant = measured.count { case (_, (p, n, h)) => n > p && n > h }
    assert(nDominant == 0, "n-edges must never dominate")
  }
}
