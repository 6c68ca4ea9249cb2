package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.expts.{Experiments, Report}

/** T2 / Fig. 14 — execution time vs small s (GD vs BU on english, stack).
  * Paper shape: time grows with s; BU-DCCS beats GD-DCCS by 1-2 orders of
  * magnitude (39x / 30x at s=4) because pruning cuts the search space by
  * 80-90%.
  */
class ExecTimeSmallSBench extends AnyFunSuite {

  private val sValues = Seq(1, 2, 3, 4, 5)

  for (name <- Seq("english", "stack")) {
    test(s"T2: execution time vs small s on $name") {
      // JIT warm-up so the first sweep entry is not penalized
      Experiments.sweepS(name, Seq(2), Seq("GD", "BU"))
      val runs = Experiments.sweepS(name, sValues, Seq("GD", "BU"))
      println(Report.execTimeVsS(s"T2 / Fig.14 — exec time vs s (small) on $name", runs))

      def of(a: String, s: Int) = runs.find(r => r.algo == a && r.s == s).get
      // search space (candidate count) grows with s for GD: C(l, s)
      assert(of("GD", 2).candidates < of("GD", 4).candidates)
      // BU pruning: far fewer candidates than GD at the default and beyond
      for (s <- Seq(3, 4, 5)) {
        assert(of("BU", s).candidates < of("GD", s).candidates,
          s"BU did not prune at s=$s")
      }
      assert(of("BU", 4).candidates <= 0.6 * of("GD", 4).candidates,
        s"expected >=40% search-space reduction at s=4: " +
        s"BU=${of("BU", 4).candidates} GD=${of("GD", 4).candidates}")
      // quality guarantee: BU within 4x of GD coverage (both-side theorems)
      sValues.foreach(s => assert(4 * of("BU", s).coverSize >= of("GD", s).coverSize))
    }
  }
}
