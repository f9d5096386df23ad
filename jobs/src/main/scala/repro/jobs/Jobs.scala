package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments._

/** Shared session + fixture bootstrap for the spark-submit entrypoints.
  * Usage: spark-submit --class repro.jobs.<Name> ... [sf]
  */
object Jobs {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def fixture(name: String, args: Array[String]): Fixture = {
    val sf = args.headOption.map(_.toDouble).getOrElse(Fixture.benchSf)
    new Fixture(session(name), sf)
  }
}

/** Table 1: build-time split (sorting vs building) at levels 13–21. */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val fx = Jobs.fixture("geoblocks-table1", args)
    println(BuildTimes.table(BuildTimes.run(fx)))
  }
}

/** Figure 1: combined-workload runtime vs number of aggregates. */
object Fig1Job {
  def main(args: Array[String]): Unit = {
    val fx = Jobs.fixture("geoblocks-fig1", args)
    println(NumAggregates.table(NumAggregates.run(fx)))
  }
}

/** Figures 6a/6b: per-engine build time and size overhead. */
object Fig6Job {
  def main(args: Array[String]): Unit = {
    val fx = Jobs.fixture("geoblocks-fig6", args)
    println(EngineOverhead.table(EngineOverhead.run(fx)))
    println(BuildTimes.table(BuildTimes.run(fx))) // Fig 6c companion
  }
}

/** Figure 7: per-query runtime vs selectivity. */
object Fig7Job {
  def main(args: Array[String]): Unit = {
    val fx = Jobs.fixture("geoblocks-fig7", args)
    println(Selectivity.table(Selectivity.run(fx)))
  }
}

/** Figure 8: relative error and runtime vs block level. */
object Fig8Job {
  def main(args: Array[String]): Unit = {
    val fx = Jobs.fixture("geoblocks-fig8", args)
    println(LevelError.table(LevelError.run(fx)))
  }
}

/** Figure 9: runtime vs workload skew. */
object Fig9Job {
  def main(args: Array[String]): Unit = {
    val fx = Jobs.fixture("geoblocks-fig9", args)
    println(SkewInfluence.table(SkewInfluence.run(fx)))
  }
}

/** Figure 10: aggregate-threshold influence. */
object Fig10Job {
  def main(args: Array[String]): Unit = {
    val fx = Jobs.fixture("geoblocks-fig10", args)
    println(ThresholdInfluence.table(ThresholdInfluence.run(fx)))
  }
}

/** Runs the entire evaluation in one go. */
object AllExperimentsJob {
  def main(args: Array[String]): Unit = {
    val fx = Jobs.fixture("geoblocks-all", args)
    println(BuildTimes.table(BuildTimes.run(fx)))
    println(EngineOverhead.table(EngineOverhead.run(fx)))
    println(NumAggregates.table(NumAggregates.run(fx)))
    println(Selectivity.table(Selectivity.run(fx)))
    println(LevelError.table(LevelError.run(fx)))
    println(SkewInfluence.table(SkewInfluence.run(fx)))
    println(ThresholdInfluence.table(ThresholdInfluence.run(fx)))
  }
}
