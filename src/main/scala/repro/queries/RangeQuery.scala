package repro.queries

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{Box, Traj}

/** Range query (Section III-B): all trajectories with at least one point in
  * the spatio-temporal box. Two implementations: a Spark SQL one over the
  * points relation (DuckDB-oracle-checked in tests) and an in-memory fast
  * path used inside the RL training loop where thousands of evaluations occur.
  */
object RangeQuery {

  /** In-memory: trajectory ids with >=1 point in the box. */
  def inMemory(db: Array[Traj], q: Box): Set[Long] = {
    val out = Set.newBuilder[Long]
    var i = 0
    while (i < db.length) {
      val tr = db(i)
      var j = 0
      var hit = false
      while (!hit && j < tr.points.length) {
        if (q.contains(tr.points(j))) hit = true
        j += 1
      }
      if (hit) out += tr.id
      i += 1
    }
    out.result()
  }

  /** Queries as a DataFrame (qid, xmin, xmax, ymin, ymax, tmin, tmax). */
  def queriesDF(spark: SparkSession, qs: Seq[Box]): DataFrame = {
    import spark.implicits._
    qs.zipWithIndex
      .map { case (b, i) => (i.toLong, b.xmin, b.xmax, b.ymin, b.ymax, b.tmin, b.tmax) }
      .toDF("qid", "xmin", "xmax", "ymin", "ymax", "tmin", "tmax")
  }

  /** Spark SQL: distinct (qid, traj_id) matches over the points relation. */
  def spark(points: DataFrame, queries: DataFrame): DataFrame = {
    val p = points; val q = queries
    p.join(q,
        p("x") >= q("xmin") && p("x") <= q("xmax") &&
          p("y") >= q("ymin") && p("y") <= q("ymax") &&
          p("t") >= q("tmin") && p("t") <= q("tmax"))
      .select(q("qid"), p("traj_id"))
      .distinct()
  }
}
