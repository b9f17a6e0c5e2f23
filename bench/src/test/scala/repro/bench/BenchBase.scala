package repro.bench

import repro.SparkSpec
import repro.harness.Tables
import repro.synth.WorldConfig

/** Shared setup for the per-table benchmark suites.
  *
  * Scale is controlled by BENCH_SCALE (default 0.5 => ~2000 ReVerb-lite /
  * ~1500 NYT-lite test triples); the BP engine by BENCH_ENGINE (default
  * "spark", the distributed LBP implementation). Expensive artifacts
  * (worlds, learned weights, JOCL runs) are memoized in [[Tables]] and
  * shared across the suites of one run.
  */
trait BenchBase extends SparkSpec {
  lazy val scale: Double = sys.env.getOrElse("BENCH_SCALE", "0.4").toDouble
  lazy val engine: String = sys.env.getOrElse("BENCH_ENGINE", "spark")
  lazy val reverb: Tables.Env = Tables.env(spark, WorldConfig.reverb45kLite(scale))
  lazy val nyt: Tables.Env = Tables.env(spark, WorldConfig.nytimes2018Lite(scale))

  def report(s: String): Unit = {
    // both captured test output and the console see the table
    println(s)
    Console.err.println(s)
  }
}
