package repro.jobs

import repro.exp.Experiments

/** spark-submit entrypoint reproducing Table II (Entity Classifier
  * validation performance per Local EMD instantiation).
  */
object RunTable2 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("repro-table2")
    try println(Experiments.renderTable2(Experiments.table2(spark)))
    finally spark.stop()
  }
}
