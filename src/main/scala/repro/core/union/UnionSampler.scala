package repro.core.union

import repro.core._
import repro.core.join._
import repro.core.walk.JTuple

/** Counters and timers of one union-sampling run, feeding the paper's
  * runtime-breakdown experiment (Fig. 5f–h): how much work went into
  * parameters, accepted answers and rejected answers.
  */
class UnionStats {
  var warmupMs: Long = 0          // parameter estimation (set by caller)
  var drawMs: Long = 0            // time inside single-join samplers
  var bookMs: Long = 0            // accept/reject/revision bookkeeping
  var joinDraws: Int = 0          // ψ — tuples obtained from join subroutines
  var accepted: Int = 0
  var rejectedDup: Int = 0        // duplicates owned by an earlier join (line 8)
  var revisions: Int = 0          // line 10-12 revisions
  var revisionRemoved: Int = 0    // tuples dropped from T by revisions
  var walkAttempts: Int = 0
  var walkFailures: Int = 0
  var eoRejected: Int = 0         // walk tuples rejected by the Olken test

  /** Sampling-phase time attributed to rejected work, proportionally to
    * the rejected share of draw attempts.
    */
  def rejectedMs: Long = {
    val att = math.max(1, walkAttempts + rejectedDup)
    val rej = walkFailures + eoRejected + rejectedDup
    (drawMs + bookMs) * rej / att
  }
  def acceptedMs: Long = drawMs + bookMs - rejectedMs
  def totalMs: Long = warmupMs + drawMs + bookMs
}

/** The sample: tuples with the join that produced them, plus run stats. */
final case class UnionSample(tuples: IndexedSeq[(JTuple, Int)], stats: UnionStats)

/** Per-join buffer of pre-drawn i.i.d. tuples: popping sequentially is
  * distributionally identical to drawing one-at-a-time, so the union
  * sampler can consume single draws while Spark works in batches.
  */
final class DrawBuffer(sampler: JoinTupleSampler, stats: UnionStats, seed: Long) {
  private val buf = scala.collection.mutable.Queue.empty[JTuple]
  private var round = 0

  /** The last refill's rejected walk tuples (Algorithm 2 reuses them). */
  var lastRejected: IndexedSeq[JTuple] = IndexedSeq.empty

  def pop(chunk: Int): JTuple = {
    if (buf.isEmpty) {
      val t0 = System.nanoTime()
      val (ts, ds) = sampler.sample(chunk, seed + 7907L * round)
      stats.drawMs += (System.nanoTime() - t0) / 1000000
      stats.joinDraws += ts.size
      stats.walkAttempts += ds.walkAttempts
      stats.walkFailures += ds.walkFailures
      stats.eoRejected += ds.rejected
      lastRejected = ds.rejectedTuples
      buf ++= ts
      round += 1
    }
    buf.dequeue()
  }
}

/** Algorithm 1 — set-union sampling with non-Bernoulli join selection.
  *
  * Each iteration selects join j with probability α_j = |J'_j|/|U| from
  * the cover implied by `params` and draws i.i.d. tuples from J_j *until
  * one is accepted*, which makes the accepted tuple uniform over the
  * not-yet-owned part of J_j — the sampled realization of the cover J'_j.
  * The cover bookkeeping: a value first seen from join i is owned by i;
  * re-drawing it from a *later* join rejects the draw (line 8, redraw);
  * re-drawing it from an *earlier* join triggers a revision — ownership
  * moves to the earlier join and all copies accepted under the later
  * owner are removed from the target sample (lines 10–12).
  *
  * Draws are buffered per join ([[DrawBuffer]]) so Spark samples in
  * batches while the bookkeeping consumes one tuple at a time.
  */
final class UnionSampler(joins: Seq[JoinSpec], params: UnionParams,
                         samplers: IndexedSeq[JoinTupleSampler], seed: Long) {
  require(joins.size == params.n && samplers.size == params.n)

  /** Precompute per-join weights/bounds (warm-up-phase work). */
  def prepare(): Unit = samplers.foreach(_.prepare())

  def sample(count: Int, batchSize: Int = 512): UnionSample = {
    val rng = new java.util.Random(seed)
    val cum = params.alphas.scanLeft(0.0)(_ + _).tail
    val stats = new UnionStats
    val buffers = samplers.map(new DrawBuffer(_, stats, seed))
    val target = scala.collection.mutable.ArrayBuffer.empty[(JTuple, Int)]
    val origJoin = scala.collection.mutable.HashMap.empty[String, Int]

    def chunk(j: Int): Int = {
      val want = math.ceil((count - target.size + 1) * params.alphas(j) * 1.5).toInt
      math.max(32, math.min(batchSize, want))
    }

    while (target.size < count) {
      val u = rng.nextDouble()
      val j = cum.indexWhere(u < _) match { case -1 => params.n - 1; case i => i }
      var accepted = false
      var redraws = 0
      // Redraw from the same join on duplicate rejection; bail out after
      // many redraws (an estimated-positive cover can be truly empty) and
      // let the outer loop reselect a join.
      while (!accepted && redraws < 10000) {
        redraws += 1
        val t = buffers(j).pop(chunk(j))
        val t1 = System.nanoTime()
        origJoin.get(t.key) match {
          case Some(i) if i < j => stats.rejectedDup += 1
          case Some(i) if i > j => // revision
            stats.revisions += 1
            val before = target.size
            target.filterInPlace(_._1.key != t.key)
            stats.revisionRemoved += before - target.size
            origJoin(t.key) = j
            target += ((t, j)); stats.accepted += 1; accepted = true
          case Some(_) => target += ((t, j)); stats.accepted += 1; accepted = true
          case None =>
            origJoin(t.key) = j
            target += ((t, j)); stats.accepted += 1; accepted = true
        }
        stats.bookMs += (System.nanoTime() - t1) / 1000000
      }
    }
    UnionSample(target.take(count).toIndexedSeq, stats)
  }
}

object UnionSampler {

  /** Build the sampler with a choice of single-join subroutine. */
  def apply(joins: Seq[JoinSpec], params: UnionParams, kind: String, seed: Long): UnionSampler = {
    val samplers: IndexedSeq[JoinTupleSampler] = kind match {
      case "EW" => joins.map(new ExactWeightSampler(_)).toIndexedSeq
      case "EO" => joins.map(new OlkenSampler(_)).toIndexedSeq
      case other => throw new IllegalArgumentException(s"unknown join sampler kind: $other")
    }
    new UnionSampler(joins, params, samplers, seed)
  }
}

/** Sampling from the *disjoint* union (Def. 1) is the straightforward
  * two-step sampler: pick join j with probability |J_j|/Σ|J_i|, then an
  * i.i.d. tuple of J_j — no cover, no rejections.
  */
final class DisjointUnionSampler(joins: Seq[JoinSpec], params: UnionParams,
                                 samplers: IndexedSeq[JoinTupleSampler], seed: Long) {
  def sample(count: Int): IndexedSeq[(JTuple, Int)] = {
    val rng = new java.util.Random(seed)
    val tot = params.joinSizes.sum
    val cum = params.joinSizes.map(_ / tot).scanLeft(0.0)(_ + _).tail
    val quota = Array.fill(params.n)(0)
    (0 until count).foreach { _ =>
      val u = rng.nextDouble()
      val j = cum.indexWhere(u < _) match { case -1 => params.n - 1; case i => i }
      quota(j) += 1
    }
    val draws = (0 until params.n).flatMap { j =>
      samplers(j).sample(quota(j), seed + j)._1.map((_, j))
    }
    new scala.util.Random(rng).shuffle(draws).toIndexedSeq
  }
}
