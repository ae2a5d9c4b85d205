package repro.jobs

import repro.exp.{Experiments, Tables}

/** Table II — dataset statistics (|V|, |E|) of every graph we evaluate on
  * (the paper's real DBLP/Amazon are replaced by the DESIGN.md stand-ins).
  *
  * Run: spark-submit --class repro.jobs.TableIIJob <jar>
  */
object TableIIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("tableII")
    val rows = Experiments.tableII(spark)
    Tables.show("Table II: dataset statistics",
      Seq("graph", "|V(G)|", "|E(G)|"),
      rows.map(r => Seq(r.name, r.nV.toString, r.nE.toString)))
    spark.stop()
  }
}
