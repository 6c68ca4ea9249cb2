package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.expts.{Experiments, Report}

/** T3 / Fig. 15 — execution time vs large s (GD, BU, TD on english, stack).
  * Paper shape: time decreases as s grows; BU degrades (sometimes worse than
  * GD); TD is the fastest (50x over GD on English at s=13).
  */
class ExecTimeLargeSBench extends AnyFunSuite {

  for (name <- Seq("english", "stack")) {
    test(s"T3: execution time vs large s on $name") {
      val l = Experiments.dataset(name).graph.numLayers
      val sValues = Seq(l - 4, l - 3, l - 2, l - 1, l)
      Experiments.sweepS(name, Seq(l - 1), Seq("GD", "BU", "TD")) // warm-up
      val runs = Experiments.sweepS(name, sValues, Seq("GD", "BU", "TD"))
      println(Report.execTimeVsS(s"T3 / Fig.15 — exec time vs s (large, l=$l) on $name", runs))

      def of(a: String, s: Int) = runs.find(r => r.algo == a && r.s == s).get
      // GD search space shrinks as s -> l
      assert(of("GD", l).candidates < of("GD", l - 4).candidates)
      // TD generates no more candidates than GD at every large s (up to the
      // k = 10 seed candidates InitTopK contributes, which dominate only at
      // the trivial tail s >= l-1 where GD has <= l candidates)
      sValues.foreach { s =>
        assert(of("TD", s).candidates <= of("GD", s).candidates + Experiments.DefaultK,
          s"TD candidates exceeded GD at s=$s")
      }
      // at the paper's headline point s = l-4 the gap is massive
      assert(10 * of("TD", l - 4).candidates < of("GD", l - 4).candidates)
      // quality: both search algorithms within 4x of GD coverage
      sValues.foreach { s =>
        assert(4 * of("BU", s).coverSize >= of("GD", s).coverSize)
        assert(4 * of("TD", s).coverSize >= of("GD", s).coverSize)
      }
    }
  }
}
