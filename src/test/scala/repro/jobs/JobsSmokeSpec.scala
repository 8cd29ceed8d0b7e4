package repro.jobs

import java.io.ByteArrayOutputStream
import org.scalatest.funsuite.AnyFunSuite

/** Every spark-submit entrypoint runs end-to-end at `small` scale and prints
  * its table. These are the same mains a cluster user would submit.
  */
class JobsSmokeSpec extends AnyFunSuite {

  private def captureStdout(body: => Unit): String = {
    val buf = new ByteArrayOutputStream()
    Console.withOut(buf)(body)
    buf.toString("UTF-8")
  }

  test("TableIJob prints the dataset table") {
    val out = captureStdout(TableIJob.main(Array("small")))
    assert(out.contains("Table I"))
    assert(out.contains("CP") && out.contains("LJ"))
  }

  test("TableIIJob prints the metric/rounds grid") {
    val out = captureStdout(TableIIJob.main(Array("small")))
    assert(out.contains("Table II"))
    assert(out.contains("GoGraph") && out.contains("PageRank"))
  }

  test("OverallPerfJob prints normalized cells for selected datasets") {
    val out = captureStdout(OverallPerfJob.main(Array("small", "IC", "CP")))
    assert(out.contains("Fig 5/6"))
    assert(out.contains("IC") && out.contains("CP"))
    assert(!out.contains("| LJ"), "dataset filter must be honored")
  }

  test("AsyncImpactJob prints the mode/order grid") {
    val out = captureStdout(AsyncImpactJob.main(Array("small", "CP")))
    assert(out.contains("Fig 8"))
    assert(out.contains("Async+GoGraph"))
  }

  test("CacheMissJob prints Fig 9 and Fig 10 tables") {
    val out = captureStdout(CacheMissJob.main(Array("small", "IC", "WK")))
    assert(out.contains("Fig 9"))
    assert(out.contains("Fig 10"))
  }

  test("AvgDegreeJob prints the BA sweep") {
    val out = captureStdout(AvgDegreeJob.main(Array("small")))
    assert(out.contains("Fig 12"))
    assert(out.contains("avg deg"))
  }

  test("PartitionMethodsJob prints the partitioner sweep") {
    val out = captureStdout(PartitionMethodsJob.main(Array("small", "IC")))
    assert(out.contains("Fig 13"))
    assert(out.contains("Fennel"))
  }

  test("ConvergenceJob prints distances for CP and LJ") {
    val out = captureStdout(ConvergenceJob.main(Array("small")))
    assert(out.contains("Fig 7"))
    assert(out.contains("PageRank/CP") && out.contains("SSSP/LJ"))
  }
}
