package repro.bench

import java.util.concurrent.atomic.AtomicLong
import scala.concurrent.{Await, Future}
import scala.concurrent.duration._
import scala.concurrent.ExecutionContext.Implicits.global
import scala.util.{Failure, Success, Try}
import org.apache.spark.scheduler.{SparkListener, SparkListenerStageCompleted}
import org.apache.spark.sql.{DataFrame, SparkSession}

/** Benchmark harness: wall-clock + total shuffle-write bytes per run
  * (SparkListener over stage metrics), with a cancel-on-timeout guard that
  * reports `FAIL` — standing in for the paper's out-of-memory crashes, which
  * a 48 GB single-node heap does not reproduce at SF≈0.1.
  *
  * Runs force full materialization through the `noop` data source (a count
  * would let Catalyst prune the nested columns under test).
  */
object Harness {

  final case class Result(table: String, config: String, strategy: String,
                          millis: Long, shuffleMB: Double, ok: Boolean, note: String = "") {
    def row: String = {
      val t = if (ok) f"${millis / 1000.0}%8.2f" else "    FAIL"
      f"| $config%-28s | $strategy%-14s | $t | ${shuffleMB}%10.1f | $note"
    }
  }

  private final class ShuffleListener extends SparkListener {
    val bytes = new AtomicLong(0)
    override def onStageCompleted(sc: SparkListenerStageCompleted): Unit = {
      val m = sc.stageInfo.taskMetrics
      if (m != null) { bytes.addAndGet(m.shuffleWriteMetrics.bytesWritten); () }
    }
  }

  def timeoutSeconds: Int = sys.env.getOrElse("BENCH_TIMEOUT_S", "300").toInt

  /** Time `action` (which must force its own computation); capture shuffle. */
  def measure(spark: SparkSession, table: String, config: String, strategy: String)
             (action: => Unit): Result = {
    val listener = new ShuffleListener
    spark.sparkContext.addSparkListener(listener)
    val group = s"$table/$config/$strategy"
    spark.sparkContext.setJobGroup(group, group, interruptOnCancel = true)
    val t0 = System.nanoTime()
    val outcome = Try {
      val fut = Future(action)
      Await.result(fut, timeoutSeconds.seconds)
    }
    val ms = (System.nanoTime() - t0) / 1000000
    spark.sparkContext.clearJobGroup()
    // Let straggler stage-completion events drain before reading the total.
    Thread.sleep(100)
    spark.sparkContext.removeSparkListener(listener)
    val mb = listener.bytes.get() / 1e6
    outcome match {
      case Success(_) => Result(table, config, strategy, ms, mb, ok = true)
      case Failure(e: java.util.concurrent.TimeoutException) =>
        spark.sparkContext.cancelJobGroup(group)
        Result(table, config, strategy, ms, mb, ok = false, note = s"timeout ${timeoutSeconds}s")
      case Failure(e) =>
        Result(table, config, strategy, ms, mb, ok = false,
          note = e.getClass.getSimpleName + ": " + Option(e.getMessage).getOrElse("").take(80))
    }
  }

  /** Force a DataFrame fully (all columns, no pruning). */
  def force(df: DataFrame): Unit =
    df.write.format("noop").mode("overwrite").save()

  /** Persist and materialize (input caching, untimed — paper counts runtime
    * after caching inputs).
    */
  def materialize(df: DataFrame): DataFrame = {
    val p = df.persist()
    p.count()
    p
  }

  def printTable(title: String, rows: Seq[Result]): Unit = {
    println()
    println(s"==== $title ====")
    println(f"| ${"config"}%-28s | ${"strategy"}%-14s | ${"time_s"}%8s | ${"shuffleMB"}%10s | note")
    rows.foreach(r => println(r.row))
    println(s"==== end $title ====")
  }

  def sf: Double = sys.env.getOrElse("BENCH_SF", "0.1").toDouble
}
