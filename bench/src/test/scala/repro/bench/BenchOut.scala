package repro.bench

import java.io.{File, FileWriter}

/** Collects bench result lines: echoed to stdout (captured in
  * bench_output.txt) and appended to bench/results/<table>.txt so
  * EXPERIMENTS.md can be curated from stable files.
  */
object BenchOut {

  // The forked bench-test JVM runs with cwd = the bench subproject dir, so
  // a plain "results" lands at bench/results from a `sbt bench/test` run.
  private val dir = new File(sys.props.getOrElse("bench.results.dir", "results"))

  def emit(table: String, line: String): Unit = synchronized {
    println(s"[$table] $line")
    dir.mkdirs()
    val fw = new FileWriter(new File(dir, s"$table.txt"), true)
    try fw.write(line + "\n") finally fw.close()
  }

  def reset(table: String): Unit = synchronized {
    dir.mkdirs()
    val f = new File(dir, s"$table.txt")
    if (f.exists()) f.delete()
  }
}
