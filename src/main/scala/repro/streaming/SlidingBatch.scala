package repro.streaming

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._
import repro.core.Monoids.SumD
import repro.core.fiba.FibaTree

/** Batch sliding-window aggregation built on the FiBA tree, used to
  * validate the operator against DuckDB's RANGE window frames: for every
  * distinct timestamp t in the input, the monoidal sum over the window
  * (t - windowLen, t]. One forward pass: bulk insert per timestamp group,
  * bulk evict to slide — the same primitives the paper defines.
  */
object SlidingBatch {

  /** df: (t: long/int, v: double) -> (t, window_sum) for each distinct t. */
  def slidingSums(spark: SparkSession, df: DataFrame, windowLen: Long): DataFrame = {
    val rows = df.select(df.columns.head, df.columns(1)).collect()
      .map(r => (r.get(0).toString.toLong, r.get(1).toString.toDouble))
      .sortBy(_._1)
    val tree = new FibaTree[Double](4, SumD)
    val out = Vector.newBuilder[Row]
    var i = 0
    while (i < rows.length) {
      val t = rows(i)._1
      var v = rows(i)._2
      i += 1
      while (i < rows.length && rows(i)._1 == t) { v += rows(i)._2; i += 1 }
      tree.bulkInsertNative(IndexedSeq((t, v)))
      tree.bulkEvictNative(t - windowLen)
      out += Row(t, tree.queryAgg())
    }
    val schema = StructType(Seq(StructField("t", LongType), StructField("window_sum", DoubleType)))
    spark.createDataFrame(spark.sparkContext.parallelize(out.result()), schema)
  }
}
