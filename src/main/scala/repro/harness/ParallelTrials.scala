package repro.harness

import scala.reflect.ClassTag
import org.apache.spark.sql.SparkSession

/** Spark fan-out of the paper's "mean over 100 samplings": one task per
  * Monte-Carlo trial, each building its sampler from a trial index, so the
  * trials run across all cores (and would scale out on a real cluster).
  */
object ParallelTrials {

  /** Run `f(0) .. f(trials-1)` as Spark tasks and collect the results.
    * `f` must close only over serializable state (streams, configs).
    */
  def run[T: ClassTag](spark: SparkSession, trials: Int)(f: Int => T): Seq[T] = {
    require(trials > 0, s"trials must be positive, got $trials")
    val sc = spark.sparkContext
    val slices = math.min(trials, math.max(1, sc.defaultParallelism))
    sc.parallelize(0 until trials, slices).map(f).collect().toSeq
  }
}
