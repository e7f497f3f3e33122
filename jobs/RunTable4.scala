package repro.jobs

import repro.exp.Experiments

/** spark-submit entrypoint reproducing Table IV (EMD Globalizer vs the
  * HIRE-NER document-level baseline on all annotated datasets).
  */
object RunTable4 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("repro-table4")
    try println(Experiments.renderTable4(Experiments.table4(spark)))
    finally spark.stop()
  }
}
