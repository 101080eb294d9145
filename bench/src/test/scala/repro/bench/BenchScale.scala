package repro.bench

/** Bench-scale knobs. Defaults reproduce the paper's parallelisms
  * (10/50 workers for NexMark, 5/10 for the cyclic query); override with
  * BENCH_WORKERS / BENCH_CYCLIC_WORKERS (comma-separated) for quick runs.
  */
object BenchScale {
  private def parse(env: String, default: Seq[Int]): Seq[Int] =
    sys.env.get(env).map(_.split(",").map(_.trim.toInt).toSeq).getOrElse(default)

  def nexmarkWorkers: Seq[Int] = parse("BENCH_WORKERS", Seq(10, 50))
  def cyclicWorkers: Seq[Int]  = parse("BENCH_CYCLIC_WORKERS", Seq(5, 10))
}
