package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}

/** Persists each bench table under bench/results/ (in addition to the
  * stdout copy captured by bench_output.txt) so EXPERIMENTS.md numbers
  * can be regenerated and diffed.
  */
object BenchOut {
  private val dir = Paths.get(sys.props.getOrElse("repro.results.dir", "bench/results"))

  def save(name: String, content: String): Unit = {
    Files.createDirectories(dir)
    Files.write(dir.resolve(s"$name.txt"), (content + "\n").getBytes("UTF-8"),
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
    println(s"=== $name ===")
    println(content)
  }
}
