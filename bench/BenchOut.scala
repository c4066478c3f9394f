package repro.bench

import java.nio.file.{Files, Paths}
import repro.exp.TableResult

/** Shared output sink for the bench suites: every table is printed (so it
  * lands in bench_output.txt) and written to bench/results/<name>.txt for
  * EXPERIMENTS.md.
  */
object BenchOut {
  def emit(name: String, t: TableResult): Unit = {
    println(t.render)
    val cwd = Paths.get(sys.props("user.dir"))
    val dir = if (cwd.getFileName != null && cwd.getFileName.toString == "bench")
      cwd.resolve("results")
    else cwd.resolve("bench").resolve("results")
    Files.createDirectories(dir)
    Files.write(dir.resolve(s"$name.txt"), t.render.getBytes("UTF-8"))
  }
}
