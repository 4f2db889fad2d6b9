package repro.jobs

import repro.exp.Fig8Experiment

/** Entry point reproducing the adaptive-execution experiments (Fig. 8a/8b). */
object AdaptiveJob {
  def main(args: Array[String]): Unit = {
    val a = Fig8Experiment.fig8a()
    println("== Fig 8a: selectivity flip, static vs adaptive ==")
    println(Fig8Experiment.header)
    a.rows.foreach(println)
    println(s"static failed at: ${a.staticFailedAt.map(t => f"$t%.1f s").getOrElse("never")}, " +
            s"adaptive failed at: ${a.adaptiveFailedAt.map(t => f"$t%.1f s").getOrElse("never")}, " +
            s"adaptive reconfigurations: ${a.adaptiveInstalls}")

    val b = Fig8Experiment.fig8b()
    println("\n== Fig 8b: STU intermediate collapses, store introduced ==")
    println(Fig8Experiment.header)
    b.rows.foreach(println)
    println(s"adaptive reconfigurations: ${b.adaptiveInstalls}")
  }
}
