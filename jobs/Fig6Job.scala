package repro.jobs

import repro.exp.{Experiments, Tables}

/** Fig. 6 — DTopL-ICDE: (a) Greedy_WP vs Greedy_WoP vs Optimal, (b)/(c)
  * L and n sweeps, (d) scalability, (e) accuracy vs Optimal at |V| = 1K.
  *
  * Run: spark-submit --class repro.jobs.Fig6Job <jar> [a|bc|d|e]
  */
object Fig6Job {
  private val header = Seq("graph", "param", "value", "WP ms", "WoP ms", "Optimal ms", "WP score", "Opt score", "accuracy")
  private def row(r: Experiments.Fig6Row): Seq[String] =
    Seq(r.graph, r.param, r.value, Tables.ms(r.wpMs), Tables.ms(r.wopMs), Tables.ms(r.optMs),
      Tables.d2(r.wpScore), Tables.d2(r.optScore), Tables.pct(r.accuracy))

  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("fig6")
    val which = args.headOption.getOrElse("all")
    if (which == "all" || which == "a")
      Tables.show("Fig 6(a): selectors at defaults", header, Experiments.fig6a(spark).map(row))
    if (which == "all" || which == "bc")
      Tables.show("Fig 6(b,c): L and n sweeps", header, Experiments.fig6bc(spark).map(row))
    if (which == "all" || which == "d")
      Tables.show("Fig 6(d): DTopL scalability in |V|", header, Experiments.fig6d(spark).map(row))
    if (which == "all" || which == "e")
      Tables.show("Fig 6(e): accuracy vs Optimal (|V|=1K)", header, Experiments.fig6e(spark).map(row))
    spark.stop()
  }
}
