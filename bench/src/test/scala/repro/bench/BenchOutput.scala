package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}

/** Writes bench table outputs under bench_results/ so EXPERIMENTS.md can be
  * assembled and re-diffed after any run of `sbt "bench/test"`.
  */
object BenchOutput {
  private val dir = Paths.get(sys.props.getOrElse("repro.bench.out", "bench_results"))

  def write(name: String, text: String): Unit = {
    Files.createDirectories(dir)
    Files.write(dir.resolve(name), text.getBytes("UTF-8"),
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
  }
}
