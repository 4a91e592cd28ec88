package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.exp.Experiments.{f, printTable}

/** T7 (Fig. 6a) — ONLINE-UNION sampling time with vs without reuse of
  * warm-up samples, vs sample size.
  *
  * Paper's shape: reuse is much faster (pool checks replace per-relation
  * walks), with the gap largest on the workload with the largest union
  * (UQ1) and smaller on UQ2.
  */
class T7ReuseBench extends SparkSpec {
  private val sf = 0.04
  private val ns = Seq(100, 300)

  test("T7: reuse beats no-reuse on all workloads") {
    for (w <- Seq("UQ1", "UQ2", "UQ3")) {
      val rows = Experiments.t7Reuse(spark, w, sf, overlap = 0.3, ns, rwWalks = 600)
      printTable(s"T7 ($w): online sampling, reuse vs no-reuse, sf=$sf",
        Seq("reuse", "N", "warmup ms", "sample ms", "pool hits", "walk attempts"),
        rows.map(r => Seq(r.reuse.toString, r.n.toString, r.warmupMs.toString,
          r.sampleMs.toString, r.poolHits.toString, r.walkAttempts.toString)))
      val withR = rows.filter(_.reuse)
      val without = rows.filter(!_.reuse)
      assert(withR.map(_.sampleMs).sum < without.map(_.sampleMs).sum,
        s"$w: reuse should cut sampling time")
      assert(withR.map(_.walkAttempts).sum < without.map(_.walkAttempts).sum,
        s"$w: reuse should cut walk attempts")
      assert(withR.forall(_.poolHits > 0) && without.forall(_.poolHits == 0))
    }
  }
}

/** T8 (Fig. 6b) — time per successfully accepted sample in the regular
  * (walk) phase vs the reuse phase.
  *
  * Paper's shape: a reuse-phase sample is much cheaper than a
  * regular-phase sample.
  */
class T8ReusePhaseBench extends SparkSpec {
  private val sf = 0.04

  test("T8: per-sample cost, regular vs reuse phase") {
    val rows = Seq("UQ1", "UQ2", "UQ3").map { w =>
      w -> Experiments.t8ReusePhase(spark, w, sf, overlap = 0.3, n = 400)
    }
    printTable("T8: ms per accepted sample, regular vs reuse phase (N=400)",
      Seq("workload", "regular ms/sample", "reuse ms/sample"),
      rows.map { case (w, r) => Seq(w, f(r.regularMsPerSample), f(r.reuseMsPerSample)) })
    rows.foreach { case (w, r) =>
      assert(r.reuseMsPerSample < r.regularMsPerSample,
        s"$w: reuse phase (${r.reuseMsPerSample}) should be cheaper than " +
          s"regular (${r.regularMsPerSample})")
    }
  }
}
