package repro.jobs

import repro.engine.{PageRank, SSSP}
import repro.eval.Eval
import repro.graph.GraphGen

/** spark-submit entrypoints for the figure-derived tables (DESIGN.md §5).
  * Each accepts an optional `small` argument to run on the unit-test scale
  * analogues.
  */
private object JobArgs {
  def load(args: Array[String]): String => repro.graph.DiGraph =
    if (args.contains("small")) GraphGen.datasetSmall _ else GraphGen.dataset _
  def datasets(args: Array[String]): Seq[String] =
    args.filter(GraphGen.datasetNames.contains) match {
      case picked if picked.nonEmpty => picked.toIndexedSeq
      case _                         => GraphGen.datasetNames
    }
}

/** Fig 5/6 as a table: normalized async runtime & rounds per reorder method. */
object OverallPerfJob {
  def main(args: Array[String]): Unit =
    println(Eval.renderOverallPerf(Eval.overallPerf(JobArgs.datasets(args), JobArgs.load(args))))
}

/** Fig 8 as a table: Sync+Default vs Async+Default vs Async+GoGraph. */
object AsyncImpactJob {
  def main(args: Array[String]): Unit =
    println(Eval.renderAsyncImpact(Eval.asyncImpact(JobArgs.datasets(args), JobArgs.load(args))))
}

/** Fig 9/10 as tables: simulated cache misses per method; ± partitioning. */
object CacheMissJob {
  def main(args: Array[String]): Unit = {
    println(Eval.renderCacheMiss(Eval.cacheMiss(JobArgs.datasets(args), JobArgs.load(args))))
    println()
    println(Eval.renderPartitionCacheImpact(
      Eval.partitionCacheImpact(JobArgs.datasets(args), JobArgs.load(args))))
  }
}

/** Fig 12 as a table: PageRank on Barabási–Albert graphs of avg degree 2–8. */
object AvgDegreeJob {
  def main(args: Array[String]): Unit = {
    val n = if (args.contains("small")) 2000 else 100000
    println(Eval.renderAvgDegree(Eval.avgDegreeSweep(n)))
  }
}

/** Fig 13 as a table: GoGraph with Rabbit/Metis/Louvain/Fennel divide phase. */
object PartitionMethodsJob {
  def main(args: Array[String]): Unit =
    println(Eval.renderPartitionMethods(
      Eval.partitionMethods(JobArgs.datasets(args), JobArgs.load(args))))
}

/** Fig 7 as a table: distance to convergence per async round, CP & LJ. */
object ConvergenceJob {
  def main(args: Array[String]): Unit = {
    val load = JobArgs.load(args)
    Seq("CP", "LJ").foreach { name =>
      val g = load(name)
      println(Eval.renderConvergence(Eval.convergence(g, PageRank, rounds = 10), s"PageRank/$name"))
      println(Eval.renderConvergence(Eval.convergence(g, SSSP, rounds = 10), s"SSSP/$name"))
    }
  }
}
