package repro.baselines

import repro.core.local.CandidateGen
import repro.core.model.HierSummary
import repro.graph.LocalGraph
import scala.collection.mutable
import scala.util.Random

/** RANDOMIZED (Navlakha et al., SIGMOD'08): repeatedly pick a random
  * unfinished supernode u, merge it with the 2-hop supernode maximizing the
  * cost-reduction ratio if positive, otherwise finalize u.
  */
object Randomized {
  def summarize(g: LocalGraph, seed: Long = 42): HierSummary = {
    val fs = new FlatState(g)
    val rng = new Random(seed)
    val unfinished = mutable.LinkedHashSet.from(rng.shuffle((0 until g.n).toList))
    while (unfinished.nonEmpty) {
      val u0 = unfinished.head
      val u = fs.find(u0)
      if (u != u0 || !fs.cnt.contains(u0)) unfinished.remove(u0)
      else {
        // 2-hop candidate supernodes
        val oneHop = fs.cnt(u).keysIterator.filter(_ != u).toArray
        val twoHop = mutable.HashSet.empty[Int]
        oneHop.foreach { c =>
          twoHop += c
          fs.cnt(c).keysIterator.foreach(d => if (d != u && d != c) twoHop += d)
        }
        var best = -1; var bestGain = 0.0
        twoHop.foreach { v =>
          val s = fs.gain(u, v)
          if (s > bestGain) { bestGain = s; best = v }
        }
        if (best >= 0) {
          val w = fs.merge(u, best)
          unfinished.remove(u0)
          unfinished.remove(best)
          unfinished += w
        } else unfinished.remove(u0)
      }
    }
    FlatModel.encode(g, fs.superOf)
  }
}

/** SWEG (Shin et al., WWW'19), lossless variant (eps = 0): min-hash grouping
  * as in SLUGGER, then within each group repeatedly pair each supernode with
  * the group member of highest neighborhood Jaccard similarity and merge if
  * the flat-model saving clears the threshold θ(t) = (1+t)^-1.
  */
object Sweg {
  def summarize(g: LocalGraph, bigT: Int = 20, seed: Long = 42): HierSummary = {
    val fs = new FlatState(g)
    for (t <- 1 to bigT) {
      val th = if (t < bigT) 1.0 / (1.0 + t) else 0.0
      val rng = new Random(seed * 31 + t)
      val groups = CandidateGen.groupsOf(g, fs.find, seed + 7919L * t)
      groups.foreach { d =>
        val q = mutable.ArrayBuffer.from(d.iterator.map(fs.find).distinct.filter(fs.cnt.contains))
        while (q.length > 1) {
          val a = q.remove(rng.nextInt(q.length))
          if (fs.cnt.contains(a)) {
            var best = -1; var bestJ = -1.0
            var i = 0
            while (i < q.length) {
              val z = q(i)
              if (fs.cnt.contains(z) && z != a) {
                val j = jaccard(fs, a, z)
                if (j > bestJ) { bestJ = j; best = z }
              }
              i += 1
            }
            if (best >= 0 && fs.gain(a, best) >= th) {
              val w = fs.merge(a, best)
              q -= best
              q += w
            }
          }
        }
      }
    }
    FlatModel.encode(g, fs.superOf)
  }

  /** Weighted Jaccard over neighbor-supernode count maps. */
  def jaccard(fs: FlatState, a: Int, b: Int): Double = {
    val ca = fs.cnt(a); val cb = fs.cnt(b)
    if (ca.isEmpty && cb.isEmpty) return 0.0
    var inter = 0L; var union = 0L
    (ca.keySet ++ cb.keySet).foreach { k =>
      val x = ca.getOrElse(k, 0); val y = cb.getOrElse(k, 0)
      inter += math.min(x, y); union += math.max(x, y)
    }
    if (union == 0) 0.0 else inter.toDouble / union
  }
}

/** SAGS (Khan et al., Computing'15) — LSH-flavored: b bands of r min-hash
  * rows form signatures; nodes sharing a band bucket are merged greedily
  * with sampling probability p, *without* evaluating the cost reduction.
  * Fastest baseline, least concise output (paper Fig. 5).
  */
object Sags {
  def summarize(g: LocalGraph, h: Int = 30, b: Int = 10, p: Double = 0.3,
                seed: Long = 42): HierSummary = {
    val fs = new FlatState(g)
    val r = h / b
    val rng = new Random(seed)
    for (band <- 0 until b) {
      // band signature per current supernode: r min-hashes over member neighborhoods
      val sig = mutable.HashMap.empty[Int, List[Long]]
      for (row <- 0 until r) {
        val hv = CandidateGen.rootShinglesOf(g, fs.find, seed + band * 1000 + row, 0)
        hv.foreach { case (root, v) => sig(root) = v :: sig.getOrElse(root, Nil) }
      }
      sig.toSeq.groupBy(_._2).valuesIterator.foreach { bucket =>
        val nodes = bucket.map(_._1).filter(fs.cnt.contains).distinct
        if (nodes.length >= 2) {
          var acc = fs.find(nodes.head)
          nodes.tail.foreach { z =>
            val zz = fs.find(z)
            if (zz != acc && rng.nextDouble() < p) acc = fs.merge(acc, zz)
          }
        }
      }
    }
    FlatModel.encode(g, fs.superOf)
  }
}

/** MoSSo-lite — a simplified offline replay of MoSSo (Ko et al., KDD'20):
  * edges arrive as a stream; on each arrival, with probability 1-e the
  * endpoint tries a move proposed by a random neighbor (join its supernode
  * or separate into a singleton) and accepts it if the flat-model cost drops.
  * Corrections are re-derived at the end by the optimal flat encoder. The
  * original maintains them incrementally; compression quality is comparable,
  * speed semantics are not reproduced.
  */
object MossoLite {
  def summarize(g: LocalGraph, e: Double = 0.3, seed: Long = 42): HierSummary = {
    val fs = new FlatState(g)
    val rng = new Random(seed)
    val stream = rng.shuffle(g.edges.toList)
    stream.foreach { case (u, v) =>
      if (rng.nextDouble() >= e) {
        tryMove(fs, g, u, rng)
        tryMove(fs, g, v, rng)
      }
    }
    FlatModel.encode(g, fs.superOf)
  }

  /** Propose moving subnode x into the supernode of one random neighbor. */
  private def tryMove(fs: FlatState, g: LocalGraph, x: Int, rng: Random): Unit = {
    val nb = g.adj(x)
    if (nb.isEmpty) return
    val y = nb(rng.nextInt(nb.length))
    val rx = fs.find(x); val ry = fs.find(y)
    if (rx == ry || fs.sizeOf(rx) != 1) return // lite: only singletons move in
    if (fs.gain(rx, ry) > 0) { fs.merge(rx, ry); () }
  }
}
