package repro.jobs

import repro.exp.{Experiments, Tables}

/** Fig. 2 — TopL-ICDE (index + pruning) vs the ATindex baseline, wall
  * clock of the online phase on all five graphs at default parameters.
  *
  * Run: spark-submit --class repro.jobs.Fig2Job <jar>
  */
object Fig2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("fig2")
    val rows = Experiments.fig2(spark)
    Tables.show("Fig 2: TopL-ICDE vs ATindex (online wall clock)",
      Seq("graph", "TopL-ICDE ms", "ATindex offline ms", "ATindex online ms", "ATindex refined", "speedup x"),
      rows.map(r => Seq(r.graph, Tables.ms(r.topLMs), Tables.ms(r.atOfflineMs),
        Tables.ms(r.atOnlineMs), r.atRefined.toString, Tables.d2(r.speedup))))
    spark.stop()
  }
}
