package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.expts.{Experiments, Report}

/** T13 / Fig. 30 — distribution of |Q ∩ Cov(R_C)| over MiMAG quasi-cliques
  * Q of size 3, 4, 5 (d = 3). Paper shape: the probability mass concentrates
  * at full containment (|Q ∩ Cov(R_C)| = |Q| with weight 0.72-1.0).
  */
class QCDistributionBench extends AnyFunSuite {

  for (name <- Seq("ppi", "author")) {
    test(s"T13: |Q ∩ Cov(R_C)| distribution on $name") {
      val cmp = Experiments.mimagCompare(name, d = 3)
      val dist = Experiments.qcDistribution(cmp, Seq(3, 4, 5))
      println(Report.qcDistribution(name, dist))
      // in every non-empty size bucket most quasi-cliques are fully inside
      // the d-CC cover
      dist.foreach { case (sz, ps) =>
        if (ps.sum > 0)
          assert(ps.last >= 0.3,
            s"$name |Q|=$sz: only ${ps.last} of quasi-cliques fully covered")
      }
      // and across all buckets the fully-covered mass dominates the
      // not-covered-at-all mass
      val nonEmpty = dist.filter(_._2.sum > 0)
      assert(nonEmpty.nonEmpty, "no quasi-cliques of size 3-5 found at all")
      assert(nonEmpty.map(_._2.last).sum >= nonEmpty.map(_._2.head).sum)
    }
  }
}
