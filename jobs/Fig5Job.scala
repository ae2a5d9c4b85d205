package repro.jobs

import repro.exp.{Experiments, Tables}

/** Fig. 5 — case study on the Amazon-like graph: the Top1-ICDE seed
  * community vs the 4-core community at the same center (σ(g) and number
  * of influenced users).
  *
  * Run: spark-submit --class repro.jobs.Fig5Job <jar>
  */
object Fig5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("fig5")
    val rows = Experiments.fig5(spark)
    Tables.show("Fig 5: case study — TopL-ICDE vs k-core",
      Seq("method", "center", "|V(g)|", "sigma", "influenced users"),
      rows.map(r => Seq(r.method, r.center.toString, r.communitySize.toString,
        Tables.d2(r.sigma), r.influenced.toString)))
    spark.stop()
  }
}
