package repro.jobs

import repro.expts.{Experiments, Report}

/** T2 / Fig. 14 — execution time vs small s. */
object RunExecTimeSmallS {
  def main(args: Array[String]): Unit =
    for (name <- Seq("english", "stack")) {
      val runs = Experiments.sweepS(name, Seq(1, 2, 3, 4, 5), Seq("GD", "BU"))
      println(Report.execTimeVsS(s"T2 / Fig.14 — exec time vs s (small) on $name", runs))
    }
}

/** T3 / Fig. 15 — execution time vs large s. */
object RunExecTimeLargeS {
  def main(args: Array[String]): Unit =
    for (name <- Seq("english", "stack")) {
      val l = Experiments.dataset(name).graph.numLayers
      val runs = Experiments.sweepS(name, Seq(l - 4, l - 3, l - 2, l - 1, l), Seq("GD", "BU", "TD"))
      println(Report.execTimeVsS(s"T3 / Fig.15 — exec time vs s (large, l=$l) on $name", runs))
    }
}

/** T4 / Figs. 16-17 — cover size vs s. */
object RunCoverSize {
  def main(args: Array[String]): Unit =
    for (name <- Seq("english", "stack")) {
      val l = Experiments.dataset(name).graph.numLayers
      println(Report.coverVsS(s"T4a / Fig.16 — cover vs s (small) on $name",
        Experiments.sweepS(name, Seq(1, 2, 3, 4, 5), Seq("GD", "BU"))))
      println(Report.coverVsS(s"T4b / Fig.17 — cover vs s (large) on $name",
        Experiments.sweepS(name, Seq(l - 4, l - 3, l - 2, l - 1, l), Seq("GD", "BU", "TD"))))
    }
}

/** T5/T6 / Figs. 18-21 — effect of d. */
object RunEffectD {
  def main(args: Array[String]): Unit =
    for (name <- Seq("german", "english")) {
      val l = Experiments.dataset(name).graph.numLayers
      println(Report.effectOfD(s"T5a / Fig.18+20 — effect of d (s=3) on $name",
        Experiments.sweepD(name, Seq(2, 3, 4, 5, 6), Seq("GD", "BU"), s = 3)))
      println(Report.effectOfD(s"T5b / Fig.19+21 — effect of d (s=l-2) on $name",
        Experiments.sweepD(name, Seq(2, 3, 4, 5, 6), Seq("GD", "TD"), s = l - 2)))
    }
}

/** T7/T8 / Figs. 22-25 — effect of k. */
object RunEffectK {
  def main(args: Array[String]): Unit =
    for (name <- Seq("wiki", "english")) {
      val l = Experiments.dataset(name).graph.numLayers
      println(Report.effectOfK(s"T7a / Fig.22+24 — effect of k (s=3) on $name",
        Experiments.sweepK(name, Seq(5, 10, 15, 20, 25), Seq("GD", "BU"), s = 3)))
      println(Report.effectOfK(s"T7b / Fig.23+25 — effect of k (s=l-2) on $name",
        Experiments.sweepK(name, Seq(5, 10, 15, 20, 25), Seq("GD", "TD"), s = l - 2)))
    }
}

/** T9/T10 / Figs. 26-27 — scalability in p and q. */
object RunScalability {
  def main(args: Array[String]): Unit = {
    val fr = Seq(0.2, 0.4, 0.6, 0.8, 1.0)
    println(Report.scalability("T9 / Fig.26 — exec time vs p on stack", "p",
      Experiments.sweepP("stack", fr, Seq("GD", "BU"), _ => 3) ++
      Experiments.sweepP("stack", fr, Seq("TD"), l => l - 2)))
    println(Report.scalability("T10 / Fig.27 — exec time vs q on stack", "q",
      Experiments.sweepQ("stack", fr, Seq("GD", "BU"), l => math.min(3, l)) ++
      Experiments.sweepQ("stack", fr, Seq("TD"), l => math.max(1, l - 2))))
  }
}

/** T11 / Fig. 28 — preprocessing ablation. */
object RunPreprocAblation {
  def main(args: Array[String]): Unit =
    for (name <- Seq("english", "stack")) {
      val l = Experiments.dataset(name).graph.numLayers
      println(Report.ablation(s"T11a / Fig.28 — BU-DCCS ablation on $name (s=3)",
        Experiments.ablation(name, "BU", s = 3)))
      println(Report.ablation(s"T11b / Fig.28 — TD-DCCS ablation on $name (s=${l - 2})",
        Experiments.ablation(name, "TD", s = l - 2)))
    }
}

/** T12 / Fig. 29 — MiMAG vs BU-DCCS. */
object RunMiMAGCompare {
  def main(args: Array[String]): Unit = {
    val cmps = for (name <- Seq("ppi", "author"); d <- Seq(2, 3, 4))
      yield Experiments.mimagCompare(name, d)
    println(Report.mimagCompare(cmps))
  }
}

/** T13 / Fig. 30 — |Q ∩ Cov(R_C)| distribution. */
object RunQCDistribution {
  def main(args: Array[String]): Unit =
    for (name <- Seq("ppi", "author")) {
      val cmp = Experiments.mimagCompare(name, d = 3)
      println(Report.qcDistribution(name, Experiments.qcDistribution(cmp, Seq(3, 4, 5))))
    }
}
