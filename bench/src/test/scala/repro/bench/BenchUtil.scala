package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}

/** Bench suites print their table and persist it under bench/results/ so the
  * numbers can be diffed against the paper's in EXPERIMENTS.md.
  */
object BenchUtil {
  def record(name: String, content: String): Unit = {
    val dir = Paths.get(sys.props.getOrElse("bench.results.dir", "bench/results"))
    Files.createDirectories(dir)
    Files.write(dir.resolve(s"$name.txt"), (content + "\n").getBytes,
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
    println(s"===== $name =====")
    println(content)
  }

  /** Benches run at full scale unless BENCH_QUICK=1. */
  def quick: Boolean = sys.env.get("BENCH_QUICK").contains("1")
}
