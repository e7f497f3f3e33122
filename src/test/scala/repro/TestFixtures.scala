package repro

import org.apache.spark.sql.SparkSession
import repro.core.Training
import repro.data.TweetGen
import repro.emd.LocalEmd

import scala.collection.mutable

/** Shared trained-framework fixtures for integration suites: training uses
  * the reduced D5Mini stream so unit tests stay fast; the benches train on
  * the full D5 (paper setting).
  */
object TestFixtures {
  private val cache = mutable.Map.empty[String, Training.Trained]

  def trained(spark: SparkSession, system: LocalEmd): Training.Trained =
    synchronized(cache.getOrElseUpdate(system.name,
      Training.trainFor(spark, system, TweetGen.D5Mini)))
}
