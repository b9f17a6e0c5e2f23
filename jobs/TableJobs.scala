package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.harness.Tables
import repro.synth.WorldConfig

/** Shared plumbing for the spark-submit table jobs: builds the session,
  * parses `--scale` / `--engine`, and prepares the two data-set envs.
  *
  * Usage: `spark-submit --class repro.jobs.Table1Job repro.jar [--scale 1.0]
  * [--engine spark|local]`
  */
object JobMain {
  final case class Args(scale: Double, engine: String)

  def parse(args: Array[String]): Args = {
    var scale = 1.0
    var engine = "spark"
    var i = 0
    while (i < args.length) {
      args(i) match {
        case "--scale" => scale = args(i + 1).toDouble; i += 2
        case "--engine" => engine = args(i + 1); i += 2
        case other => throw new IllegalArgumentException(s"unknown arg: $other")
      }
    }
    Args(scale, engine)
  }

  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions",
        sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def withEnvs(name: String, args: Array[String])(
      body: (SparkSession, Tables.Env, Tables.Env, String) => String): Unit = {
    val a = parse(args)
    val spark = session(name)
    try {
      val reverb = Tables.env(spark, WorldConfig.reverb45kLite(a.scale))
      val nyt = Tables.env(spark, WorldConfig.nytimes2018Lite(a.scale))
      // stdout is the job's report; shapes are compared in EXPERIMENTS.md
      println(body(spark, reverb, nyt, a.engine))
    } finally spark.stop()
  }
}

/** Table 1: NP canonicalization over both data sets. */
object Table1Job {
  def main(args: Array[String]): Unit =
    JobMain.withEnvs("jocl-table1", args) { (spark, reverb, nyt, engine) =>
      Tables.renderCanon("Table 1: NP canonicalization",
        Tables.table1(spark, reverb, Seq(nyt), engine))
    }
}

/** Table 2: RP canonicalization over ReVerb-lite. */
object Table2Job {
  def main(args: Array[String]): Unit =
    JobMain.withEnvs("jocl-table2", args) { (spark, reverb, _, engine) =>
      Tables.renderCanon("Table 2: RP canonicalization",
        Tables.table2(spark, reverb, engine))
    }
}

/** Table 3: OKB entity linking over both data sets. */
object Table3Job {
  def main(args: Array[String]): Unit =
    JobMain.withEnvs("jocl-table3", args) { (spark, reverb, nyt, engine) =>
      Tables.renderLinks("Table 3: OKB entity linking",
        Tables.table3(spark, reverb, Seq(nyt), engine))
    }
}

/** Table 4: JOCL ablation (interaction between the two tasks). */
object Table4Job {
  def main(args: Array[String]): Unit =
    JobMain.withEnvs("jocl-table4", args) { (spark, reverb, _, engine) =>
      Tables.renderAblation(Tables.table4(spark, reverb, engine))
    }
}

/** Table 5 (numbers behind Figure 4): feature-combination variants. */
object Table5Job {
  def main(args: Array[String]): Unit =
    JobMain.withEnvs("jocl-table5", args) { (spark, reverb, _, engine) =>
      Tables.renderFeatures(Tables.table5(spark, reverb, engine))
    }
}
