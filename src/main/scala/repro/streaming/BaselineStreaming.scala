package repro.streaming

import org.apache.spark.sql.{DataFrame, Dataset}
import org.apache.spark.sql.functions._

/** The comparator for Fig 17: the engine's built-in sliding-window
  * aggregation. Like Flink's sliding windows, Spark's `window()` assigns
  * every row to every pane it falls in (windowLen / slide panes), paying
  * per-pane duplication instead of incremental aggregation — that
  * duplication is exactly what FiBA's single-tree state avoids.
  */
object BaselineStreaming {

  /** Built-in sliding window sum per key. `slide` defaults coarser than
    * the paper's 1-record slide to keep the baseline's blow-up tractable
    * — a handicap in the baseline's favor (see EXPERIMENTS.md).
    */
  def builtinSliding(events: Dataset[Event], windowLenSec: Long, slideSec: Long): DataFrame = {
    events.toDF()
      .withColumn("ts", timestamp_seconds(col("time")))
      .groupBy(col("key"), window(col("ts"), s"$windowLenSec seconds", s"$slideSec seconds"))
      .agg(sum(col("value")).as("agg"))
  }
}
