package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.baselines.Baselines
import repro.core.RL4QDTS
import repro.exp.Experiments
import repro.traj.ErrorMeasures

/** spark-submit entrypoint: simplify a trajectory relation with a baseline or
  * with RL4QDTS (training a fresh policy on synthetic data first).
  *
  * Usage: SimplifyJob <inParquet> <outParquet> <ratio> <method> [measure]
  *   method: topdown | bottomup | spansearch | rl4qdts
  *   measure (baselines): SED | PED | DAD | SAD
  */
object SimplifyJob {
  def main(args: Array[String]): Unit = {
    require(args.length >= 4, "usage: SimplifyJob <in> <out> <ratio> <method> [measure]")
    val spark = SparkSession.builder.appName("repro-simplify").getOrCreate()
    val in = spark.read.parquet(args(0))
    val r = args(2).toDouble
    val out = args(3).toLowerCase match {
      case "rl4qdts" =>
        val agents = Experiments.trainAgents()
        RL4QDTS.simplifySpark(in, r, agents.cubeNet.snapshot, agents.pointNet.snapshot,
          Experiments.benchParams, nGroups = spark.sparkContext.defaultParallelism,
          nQueries = 100, querySizeXY = 2000.0)
      case m =>
        val measure = ErrorMeasures.byName(if (args.length > 4) args(4) else "SED")
        Baselines.simplifyESpark(in, m, measure, r)
    }
    out.write.mode("overwrite").parquet(args(1))
    println(s"wrote simplified relation (${out.count()} points) to ${args(1)}")
    spark.stop()
  }
}
