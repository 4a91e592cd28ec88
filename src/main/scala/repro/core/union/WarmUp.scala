package repro.core.union

import repro.core._
import repro.core.histogram.HistogramOverlap
import repro.core.walk._

/** Result of a RANDOM-WALK warm-up: the estimated parameters, the walk
  * batches (Algorithm 2 reuses their tuples), the per-join online HT
  * statistics, and the membership tables `memb(j)(i)` = keys of join j's
  * samples found in join i.
  */
final case class RandomWalkWarmup(params: UnionParams,
                                  batches: IndexedSeq[WalkBatch],
                                  stats: IndexedSeq[WalkStats],
                                  memberships: Map[(Int, Int), Set[String]])

/** The warm-up phase of Algorithm 1 (§4): produce `{|J_j|}, {|O_Δ|}` (and
  * therefore `{|J'_j|}, |U|`) by one of the framework's instantiations.
  */
object WarmUp {

  /** Ground-truth parameters (for tests and for the FullJoinUnion rows of
    * the experiments).
    */
  def exact(fju: FullJoinUnion): UnionParams = fju.params

  /** HISTOGRAM-BASED instantiation (§5): degree statistics only. */
  def histogram(joins: Seq[JoinSpec], refined: Boolean = false): UnionParams =
    HistogramOverlap.estimate(joins, refined)

  /** RANDOM-WALK instantiation (§6): `walksPerJoin` wander-join walks per
    * join estimate |J_j| (HT), membership probes of each join's samples
    * against every other join estimate p̂_Δ, and Eq. 2 gives |O_Δ| anchored
    * at the smallest-index join of Δ.
    */
  def randomWalk(joins: Seq[JoinSpec], walksPerJoin: Int, seed: Long): RandomWalkWarmup = {
    val n = joins.size
    val batches = IndexedSeq.tabulate(n)(j => WanderJoin.walkBatch(joins(j), walksPerJoin, seed + 37 * j))
    assemble(joins, batches)
  }

  /** §6.1's adaptive stopping rule: walk each join in batches until the
    * size estimate's relative CI half-width (level `z`) drops below
    * `epsilon`, or `maxWalks` walks have been spent — the paper terminates
    * at 90% confidence or 1,000 samples.
    */
  def randomWalkAdaptive(joins: Seq[JoinSpec], epsilon: Double = 0.1,
                         z: Double = 1.96, batch: Int = 200, maxWalks: Int = 1000,
                         seed: Long = 42): RandomWalkWarmup = {
    val n = joins.size
    val batches = IndexedSeq.tabulate(n) { j =>
      var acc = WanderJoin.walkBatch(joins(j), batch, seed + 37 * j)
      var round = 1
      def settled(b: WalkBatch): Boolean = {
        val s = new WalkStats
        b.samples.foreach(t => s.add(1.0 / t.p))
        (0 until b.failures).foreach(_ => s.add(0.0))
        s.mean > 0 && s.ciHalfWidth(z) <= epsilon * s.mean
      }
      while (!settled(acc) && acc.requested < maxWalks) {
        val more = WanderJoin.walkBatch(joins(j), batch, seed + 37 * j + 1000 * round)
        acc = WalkBatch(acc.samples ++ more.samples, acc.requested + more.requested)
        round += 1
      }
      acc
    }
    assemble(joins, batches)
  }

  private def assemble(joins: Seq[JoinSpec], batches: IndexedSeq[WalkBatch]): RandomWalkWarmup = {
    val n = joins.size
    val stats = IndexedSeq.tabulate(n) { j =>
      val s = new WalkStats
      batches(j).samples.foreach(t => s.add(1.0 / t.p))
      (0 until batches(j).failures).foreach(_ => s.add(0.0))
      s
    }
    val memberships = (for {
      j <- 0 until n
      i <- 0 until n if i != j
    } yield (j, i) -> WanderJoin.membership(joins(i), batches(j).samples)).toMap

    RandomWalkWarmup(
      paramsFrom(n, stats.map(_.mean), batches, memberships), batches, stats, memberships)
  }

  /** Assemble UnionParams from walk-based sizes + membership tables —
    * shared by the warm-up and by Algorithm 2's backtracking updates.
    */
  def paramsFrom(n: Int, sizes: Seq[Double], batches: IndexedSeq[WalkBatch],
                 memberships: Map[(Int, Int), Set[String]]): UnionParams = {
    val overlaps = (1 to n).flatMap { k =>
      (0 until n).combinations(k).map { idx =>
        val d = idx.toSet
        val est =
          if (d.size == 1) sizes(d.head)
          else {
            val anchor = d.min
            val others = (d - anchor).toSeq
            val pHat = RandomWalkOverlap.membershipFraction(
              batches(anchor).samples,
              t => others.forall(i => memberships((anchor, i)).contains(t.key)))
            RandomWalkOverlap.overlapEstimate(sizes(anchor), pHat)
          }
        d -> est
      }
    }.toMap
    UnionParams(n, HistogramOverlap.monotonize(n, overlaps))
  }
}
