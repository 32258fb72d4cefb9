package repro.jobs

import java.io.File

import repro.SparkSpec

/** Smoke tests for the spark-submit entrypoints: each job must run end to
  * end at a tiny scale, reuse (and not tear down) the host session, and
  * leave its report under bench/results/.
  */
class JobsSpec extends SparkSpec {

  // Redirect artifacts so smoke runs never clobber real bench results.
  private val outDir: File = {
    val d = java.nio.file.Files.createTempDirectory("repro-jobs-smoke").toFile
    sys.props("repro.results.dir") = d.getPath
    d
  }

  override def afterAll(): Unit = {
    sys.props -= "repro.results.dir"
    super.afterAll()
  }

  test("Table3Job runs and writes its report") {
    spark.sparkContext.setLogLevel("WARN")
    Table3Job.main(Array("400"))
    assert(new File(outDir, "table3_mlpack.txt").exists())
    assert(!spark.sparkContext.isStopped, "job must not stop a shared session")
  }

  test("Table4Job runs, writes report and CSV") {
    Table4Job.main(Array("400"))
    assert(new File(outDir, "table4_emst.txt").exists())
    assert(new File(outDir, "table4_csv").exists())
    assert(!spark.sparkContext.isStopped)
  }

  test("Table5Job runs, writes report and CSV") {
    Table5Job.main(Array("400"))
    assert(new File(outDir, "table5_hdbscan.txt").exists())
    assert(new File(outDir, "table5_csv").exists())
    assert(!spark.sparkContext.isStopped)
  }
}
