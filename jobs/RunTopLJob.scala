package repro.jobs

import repro.core.Pipeline
import repro.exp.{Experiments, Tables}
import repro.graph.GraphGen

/** Ad-hoc TopL-ICDE query over a generated graph.
  *
  * Run: spark-submit --class repro.jobs.RunTopLJob <jar> \
  *        [nVertices] [k] [r] [theta] [L] [|Q|]
  */
object RunTopLJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("topl")
    val n = args.lift(0).map(_.toLong).getOrElse(Experiments.DefaultN)
    val q = Experiments.query(
      qSize = args.lift(5).map(_.toInt).getOrElse(Experiments.DefaultQSize),
      k = args.lift(1).map(_.toInt).getOrElse(Experiments.DefaultK),
      r = args.lift(2).map(_.toInt).getOrElse(Experiments.DefaultR),
      theta = args.lift(3).map(_.toDouble).getOrElse(Experiments.DefaultTheta),
      l = args.lift(4).map(_.toInt).getOrElse(Experiments.DefaultL))
    val built = Pipeline.build(spark, GraphGen.nws(spark, n), Experiments.RMax, Experiments.ThetaGrid)
    val (res, ms) = Experiments.timeMs(built.topL(q))
    println(s"offline: ${built.offlineMillis} ms, online: ${Tables.ms(ms)} ms")
    Tables.show(s"Top-${q.L} most influential communities",
      Seq("rank", "center", "|V(g)|", "sigma", "|g^Inf|"),
      res.communities.zipWithIndex.map { case (c, i) =>
        Seq((i + 1).toString, c.center.toString, c.vertices.length.toString,
          Tables.d2(c.sigma), c.cpp.size.toString)
      })
    spark.stop()
  }
}
