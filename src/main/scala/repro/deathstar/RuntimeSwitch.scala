package repro.deathstar

import org.apache.spark.sql.SparkSession
import repro.core.Compiler
import repro.core.Dataflow.DataflowGraph
import repro.faas.FaasRuntime
import repro.runtime.LocalRuntime
import repro.spark.{SparkBatchRuntime, SparkStreamRuntime}

/** The paper's portability claim, executable: "switching between the
  * different runtimes requires less than 10 lines of code". The compiled
  * dataflow graph is runtime-independent; each deployment below is the
  * entire code needed to target another runtime. [[Loc.runtimeSwitch]]
  * counts this file for the E4 table. */
object RuntimeSwitch {
  val graph: DataflowGraph = Compiler.compile(HotelApp.program)
  def local(): LocalRuntime = new LocalRuntime(graph)
  def faas(): FaasRuntime = new FaasRuntime(graph)
  def sparkBatch(spark: SparkSession): SparkBatchRuntime = new SparkBatchRuntime(spark, graph)
  def sparkStream(spark: SparkSession): SparkStreamRuntime = new SparkStreamRuntime(spark, graph)
}
