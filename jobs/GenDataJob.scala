package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.data.TrajGen

/** spark-submit entrypoint: generate a synthetic trajectory dataset.
  *
  * Usage: GenDataJob <profile: geolife|tdrive|chengdu|osm> <nTrajs> <outPath> [seed]
  * Writes the (traj_id, idx, x, y, t) relation as Parquet.
  */
object GenDataJob {
  def main(args: Array[String]): Unit = {
    require(args.length >= 3, "usage: GenDataJob <profile> <nTrajs> <outPath> [seed]")
    val spark = SparkSession.builder.appName("repro-gendata").getOrCreate()
    val profile = TrajGen.profiles(args(0))
    val n = args(1).toInt
    val seed = if (args.length > 3) args(3).toLong else 42L
    TrajGen.genDF(spark, profile, n, seed).write.mode("overwrite").parquet(args(2))
    println(s"wrote $n ${profile.name} trajectories to ${args(2)}")
    spark.stop()
  }
}
