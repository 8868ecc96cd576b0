package repro.bench

/** Persists each bench table under bench/results/ so EXPERIMENTS.md can be
  * diffed against a reproducible artifact.
  */
object BenchOutput {
  def write(name: String, content: String): Unit = {
    val dir = java.nio.file.Paths.get("results")
    java.nio.file.Files.createDirectories(dir)
    java.nio.file.Files.write(dir.resolve(name), content.getBytes("UTF-8"))
  }
}
