package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Fig7Experiment

/** Entry point reproducing the multi-query performance experiment (Fig. 7). */
object MultiQueryJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-multiquery")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    val sf = args.headOption.map(_.toDouble).getOrElse(0.01)

    for (nQ <- Seq(5, 10)) {
      val w = Fig7Experiment.workload(spark, sf, horizon = 600.0, window = 60.0, nQ, seed = 4242)
      println(s"== Fig 7: $nQ queries at SF=$sf ==")
      w.queries.foreach(q => println(s"  ${q.name}: ${q.relations.toVector.sorted.mkString(",")} " +
                                     s"on ${q.predicates.map(_.toString).toVector.sorted.mkString(" & ")}"))
      println(Fig7Experiment.header)
      Fig7Experiment.run(w).foreach(r => println(r.tsv))
    }
    spark.stop()
  }
}
