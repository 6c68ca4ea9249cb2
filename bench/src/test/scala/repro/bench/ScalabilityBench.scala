package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.expts.{Experiments, Report}

/** T9/T10 / Figs. 26-27 — scalability on the largest dataset (stack) w.r.t.
  * the vertex fraction p and the layer fraction q.
  * Paper shape: roughly linear growth in p for all algorithms; growth in q,
  * with GD's search space growing much faster than BU/TD (C(l,s) blow-up).
  * GD/BU run at the small-s default (s=3); TD at its large-s default l-2.
  */
class ScalabilityBench extends AnyFunSuite {

  private val fractions = Seq(0.2, 0.4, 0.6, 0.8, 1.0)

  test("T9: scalability vs vertex fraction p on stack") {
    val runsSmall = Experiments.sweepP("stack", fractions, Seq("GD", "BU"), _ => 3)
    val runsTd = Experiments.sweepP("stack", fractions, Seq("TD"), l => l - 2)
    val runs = runsSmall ++ runsTd
    println(Report.scalability("T9 / Fig.26 — exec time vs p on stack (GD/BU: s=3, TD: s=l-2)", "p", runs))
    def of(a: String, p: Double) = runs.find { case (pp, r) => r.algo == a && pp == p }.get._2
    // more vertices -> more coverable mass
    Seq("GD", "BU").foreach(a => assert(of(a, 0.2).coverSize <= of(a, 1.0).coverSize))
    // GD candidate count is p-independent (C(l,s)); BU never exceeds it by
    // more than its k InitTopK seeds (at p=0.2 the communities are shredded,
    // coverage is tiny and Eq.(1) prunes nothing, so BU degenerates to full
    // enumeration -- the paper's pruning power comes from large covers)
    assert(of("GD", 0.2).candidates == of("GD", 1.0).candidates)
    fractions.foreach(p =>
      assert(of("BU", p).candidates <= of("GD", p).candidates + Experiments.DefaultK))
  }

  test("T10: scalability vs layer fraction q on stack") {
    val runsSmall = Experiments.sweepQ("stack", fractions, Seq("GD", "BU"), l => math.min(3, l))
    val runsTd = Experiments.sweepQ("stack", fractions, Seq("TD"), l => math.max(1, l - 2))
    val runs = runsSmall ++ runsTd
    println(Report.scalability("T10 / Fig.27 — exec time vs q on stack (GD/BU: s=3, TD: s=l-2)", "q", runs))
    def of(a: String, q: Double) = runs.find { case (qq, r) => r.algo == a && qq == q }.get._2
    // GD search space grows steeply with q: C(l,3) at l=24 vs l=5
    assert(of("GD", 1.0).candidates > 10 * of("GD", 0.2).candidates)
    // BU search space grows much slower than GD's
    val gdGrowth = of("GD", 1.0).candidates.toDouble / of("GD", 0.2).candidates
    val buGrowth = of("BU", 1.0).candidates.toDouble / math.max(1, of("BU", 0.2).candidates)
    assert(buGrowth <= gdGrowth,
      s"BU candidate growth ($buGrowth) outpaced GD ($gdGrowth)")
  }
}
