package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.expts.{Experiments, Report}

/** T5/T6 / Figs. 18-21 — effect of d on execution time and cover size.
  * Paper shape: both time and cover decrease as d grows (smaller cores,
  * smaller candidates); BU/TD remain faster than GD throughout.
  */
class EffectDBench extends AnyFunSuite {

  private val dValues = Seq(2, 3, 4, 5, 6)

  for (name <- Seq("german", "english")) {
    test(s"T5a/T6a: effect of d at small s=3 (GD vs BU) on $name") {
      Experiments.sweepD(name, Seq(4), Seq("GD", "BU"), s = 3) // warm-up
      val runs = Experiments.sweepD(name, dValues, Seq("GD", "BU"), s = 3)
      println(Report.effectOfD(s"T5a / Fig.18+20 — effect of d (s=3) on $name", runs))
      def of(a: String, d: Int) = runs.find(r => r.algo == a && r.d == d).get
      // candidate cores only shrink with d (Property 2), so cover trends
      // down; greedy selection adds a little noise, hence the 5% tolerance
      Seq("GD", "BU").foreach(a =>
        assert(of(a, 6).coverSize <= 1.05 * of(a, 2).coverSize))
      dValues.foreach(d => assert(4 * of("BU", d).coverSize >= of("GD", d).coverSize))
      dValues.foreach(d =>
        assert(of("BU", d).candidates <= of("GD", d).candidates + Experiments.DefaultK))
    }

    test(s"T5b/T6b: effect of d at large s=l-2 (GD vs TD) on $name") {
      val l = Experiments.dataset(name).graph.numLayers
      val runs = Experiments.sweepD(name, dValues, Seq("GD", "TD"), s = l - 2)
      println(Report.effectOfD(s"T5b / Fig.19+21 — effect of d (s=l-2=${l - 2}) on $name", runs))
      def of(a: String, d: Int) = runs.find(r => r.algo == a && r.d == d).get
      Seq("GD", "TD").foreach(a =>
        assert(of(a, 6).coverSize <= 1.05 * of(a, 2).coverSize))
      dValues.foreach(d => assert(4 * of("TD", d).coverSize >= of("GD", d).coverSize))
      dValues.foreach(d =>
        assert(of("TD", d).candidates <= of("GD", d).candidates + Experiments.DefaultK))
    }
  }
}
