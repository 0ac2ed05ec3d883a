package repro.jobs

import repro.exp.{CostEfficiencyExp, TableFmt}

/** spark-submit entrypoint reproducing Table 6 (initialization costs of GC
  * and LC, varying n). Pure-driver computation: the cost estimators are
  * data independent (Section 6.2 of the paper).
  *
  * Usage: spark-submit --class repro.jobs.Table6Job repro.jar [maxExp]
  */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val maxExp = args.headOption.map(_.toInt).getOrElse(10)
    val rows = CostEfficiencyExp.table6(maxExp)
    println(TableFmt.render("Table 6: initialization costs of GC and LC (varying n)",
      Seq("n", "IGC (ms)", "NGC (ms)", "ILC (ms)", "NLC (s)"),
      rows.map { case (n, g, l) =>
        Seq(n.toString, TableFmt.ms(g.initNanos.toDouble), TableFmt.ms(g.naiveNanosPerEval),
          TableFmt.ms(l.initNanos.toDouble), TableFmt.secs(l.naiveNanosPerEval))
      }))
  }
}
