package repro.jobs

import repro.eval.Eval

/** spark-submit entrypoint reproducing Table I (dataset statistics).
  * Usage: spark-submit --class repro.jobs.TableIJob <jar> [small]
  */
object TableIJob {
  def main(args: Array[String]): Unit = {
    val load = if (args.contains("small")) repro.graph.GraphGen.datasetSmall _
               else repro.graph.GraphGen.dataset _
    println(Eval.renderTableI(Eval.tableI(load)))
  }
}
