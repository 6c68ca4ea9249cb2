package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.expts.{Experiments, Report}

/** T4 / Figs. 16-17 — cover size |Cov(R)| vs s, small and large.
  * Paper shape: cover decreases with s (Property 3); BU/TD covers are close
  * to GD (GD occasionally slightly ahead: (1-1/e)- vs 1/4-approximation).
  */
class CoverSizeBench extends AnyFunSuite {

  for (name <- Seq("english", "stack")) {
    test(s"T4a: cover size vs small s on $name") {
      val runs = Experiments.sweepS(name, Seq(1, 2, 3, 4, 5), Seq("GD", "BU"))
      println(Report.coverVsS(s"T4a / Fig.16 — cover size vs s (small) on $name", runs))
      def of(a: String, s: Int) = runs.find(r => r.algo == a && r.s == s).get
      // strong downward trend over the sweep for the baseline
      assert(of("GD", 5).coverSize <= of("GD", 1).coverSize)
      (1 to 5).foreach(s => assert(4 * of("BU", s).coverSize >= of("GD", s).coverSize))
    }

    test(s"T4b: cover size vs large s on $name") {
      val l = Experiments.dataset(name).graph.numLayers
      val sValues = Seq(l - 4, l - 3, l - 2, l - 1, l)
      val runs = Experiments.sweepS(name, sValues, Seq("GD", "BU", "TD"))
      println(Report.coverVsS(s"T4b / Fig.17 — cover size vs s (large, l=$l) on $name", runs))
      def of(a: String, s: Int) = runs.find(r => r.algo == a && r.s == s).get
      assert(of("GD", l).coverSize <= of("GD", l - 4).coverSize)
      sValues.foreach { s =>
        assert(4 * of("BU", s).coverSize >= of("GD", s).coverSize)
        assert(4 * of("TD", s).coverSize >= of("GD", s).coverSize)
      }
    }
  }
}
