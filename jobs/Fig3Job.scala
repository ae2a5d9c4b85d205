package repro.jobs

import repro.exp.{Experiments, Tables}

/** Fig. 3 — robustness sweeps of the TopL-ICDE online phase:
  * (a) θ, (b) |Q|, (c) k, (d) r, (e) L on fixed default graphs;
  * (f) |v.W|, (g) |Σ| on regenerated graphs; (h) scalability in |V|.
  *
  * Run: spark-submit --class repro.jobs.Fig3Job <jar> [fixed|regen|scale]
  */
object Fig3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("fig3")
    val which = args.headOption.getOrElse("all")
    def sweepTable(title: String, rows: Seq[Experiments.SweepRow]): Unit =
      Tables.show(title, Seq("graph", "param", "value", "wall ms", "answers"),
        rows.map(r => Seq(r.graph, r.param, r.value, Tables.ms(r.ms), r.answers.toString)))
    if (which == "all" || which == "fixed")
      sweepTable("Fig 3(a-e): theta/|Q|/k/r/L sweeps", Experiments.fig3Fixed(spark))
    if (which == "all" || which == "regen")
      sweepTable("Fig 3(f-g): |v.W| and |Sigma| sweeps", Experiments.fig3Regen(spark))
    if (which == "all" || which == "scale") {
      val rows = Experiments.fig3h(spark)
      Tables.show("Fig 3(h): scalability in |V|",
        Seq("graph", "|V|", "offline ms", "online ms", "answers"),
        rows.map(r => Seq(r.graph, r.n.toString, Tables.ms(r.offlineMs), Tables.ms(r.onlineMs), r.answers.toString)))
    }
    spark.stop()
  }
}
