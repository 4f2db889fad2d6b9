package repro.jobs

import repro.exp.Fig9Experiment

/** Entry point reproducing the ILP experiments (Fig. 9a–9f).
  * Usage: spark-submit --class repro.jobs.IlpJob repro.jar [quick|full]
  */
object IlpJob {
  def main(args: Array[String]): Unit = {
    val full = args.headOption.contains("full")
    println("== Fig 9a/9b: queries of size 3 over 10 relations ==")
    println(Fig9Experiment.header)
    val nQs = if (full) Seq(10, 20, 30, 40, 50, 60, 70, 80, 90, 100) else Seq(10, 30, 50, 100)
    nQs.foreach(nQ => println(Fig9Experiment.run(10, nQ, 3, seed = 7 * nQ).tsv))

    println("\n== Fig 9c/9d/9e: queries of size 3 over 100 relations ==")
    println(Fig9Experiment.header)
    nQs.foreach(nQ => println(Fig9Experiment.run(100, nQ, 3, seed = 11 * nQ).tsv))

    println("\n== Fig 9f: query sizes 3/4/5 over 100 relations ==")
    println(Fig9Experiment.header)
    for (size <- Seq(3, 4, 5); nQ <- Seq(10, 20, 30))
      println(Fig9Experiment.run(100, nQ, size, seed = 13 * nQ + size).tsv)
  }
}
