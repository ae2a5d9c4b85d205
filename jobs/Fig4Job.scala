package repro.jobs

import repro.exp.{Experiments, Tables}

/** Fig. 4 — ablation of the pruning strategies: number of pruned
  * candidates and online wall clock for keyword / +support / +score.
  *
  * Run: spark-submit --class repro.jobs.Fig4Job <jar>
  */
object Fig4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("fig4")
    val rows = Experiments.fig4(spark)
    Tables.show("Fig 4: pruning ablation",
      Seq("graph", "pruning", "pruned", "refined", "wall ms"),
      rows.map(r => Seq(r.graph, r.config, r.pruned.toString, r.refined.toString, Tables.ms(r.ms))))
    spark.stop()
  }
}
