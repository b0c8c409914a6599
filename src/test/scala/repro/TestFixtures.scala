package repro

import org.apache.spark.sql.SparkSession
import repro.core._

/** Expensive shared fixtures, built once per test JVM (Test/fork with
  * parallelExecution=false gives one JVM per run).
  */
object TestFixtures {
  def spark: SparkSession = SparkSpec.shared

  lazy val tiny: VectorData.Spec = VectorData.tiny
  lazy val tinyLocal: Array[Array[Float]] = tiny.localData
  lazy val tinyModel: HdIndexModel =
    HdIndex.build(spark, tiny.data(spark), tinyLocal, HdIndex.configFor(tiny))
  lazy val tinyQueries: Array[VecRow] = tiny.queries
  lazy val tinyTruth: Array[Array[(Long, Double)]] =
    repro.baselines.LinearScan.groundTruth(spark, tiny.data(spark), tinyQueries, 100)

  def getVec(id: Long): Array[Float] = tinyLocal(id.toInt)
}
