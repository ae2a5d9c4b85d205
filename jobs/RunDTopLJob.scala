package repro.jobs

import repro.core.Pipeline
import repro.exp.{Experiments, Tables}
import repro.graph.GraphGen

/** Ad-hoc DTopL-ICDE query over a generated graph.
  *
  * Run: spark-submit --class repro.jobs.RunDTopLJob <jar> [nVertices] [L] [n]
  */
object RunDTopLJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("dtopl")
    val nV = args.lift(0).map(_.toLong).getOrElse(Experiments.DefaultN)
    val l = args.lift(1).map(_.toInt).getOrElse(Experiments.DefaultL)
    val nDiv = args.lift(2).map(_.toInt).getOrElse(Experiments.DefaultNDiv)
    val built = Pipeline.build(spark, GraphGen.nws(spark, nV), Experiments.RMax, Experiments.ThetaGrid)
    val (res, ms) = Experiments.timeMs(built.dTopL(Experiments.query(l = l), nDiv))
    println(f"offline: ${built.offlineMillis} ms, online: ${Tables.ms(ms)} ms, diversity D(S) = ${res.score}%.2f")
    Tables.show(s"Diversified top-$l communities (n=$nDiv)",
      Seq("pick", "center", "|V(g)|", "sigma"),
      res.selected.zipWithIndex.map { case (c, i) =>
        Seq((i + 1).toString, c.center.toString, c.vertices.length.toString, Tables.d2(c.sigma))
      })
    spark.stop()
  }
}
