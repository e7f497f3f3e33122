package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces Table II: validation performance of the Entity Classifier for
  * each Local EMD instantiation (trained on D5 candidates, 80-20 split,
  * Adam lr 0.0015, batch 128, early stopping).
  */
class Table2Bench extends SparkSpec {

  private lazy val rows = Experiments.table2(spark)

  test("Table II: Entity Classifier validation performance") {
    println("\n===== Table II (measured) =====")
    println(Experiments.renderTable2(rows))
    println("\nPaper: " + PaperNumbers.table2.toSeq.sortBy(_._1).map {
      case (s, (sz, f1)) => s"$s($sz)=$f1"
    }.mkString(", "))
    assert(rows.size == 4)
  }

  test("embedding size labels match the paper (6+1, 6+1, 100+1, 300+1)") {
    rows.foreach { r =>
      assert(r.embeddingSize == PaperNumbers.table2(r.system)._1,
        s"${r.system}: ${r.embeddingSize}")
    }
  }

  test("validation F1 is high for every instantiation (paper: 0.908–0.941)") {
    rows.foreach { r =>
      assert(r.validationF1 > 0.85 && r.validationF1 <= 1.0,
        s"${r.system}: valF1=${r.validationF1}")
    }
  }

  test("phrase embedder validation loss is small for deep systems (paper: 0.185/0.167)") {
    rows.filter(r => Set("Aguilar et al.", "BERTweet").contains(r.system)).foreach { r =>
      assert(r.peValidationLoss.isDefined)
      assert(r.peValidationLoss.get < 0.3, s"${r.system}: peLoss=${r.peValidationLoss.get}")
    }
  }

  test("non-deep systems have no phrase embedder") {
    rows.filter(r => Set("NP Chunker", "TwitterNLP").contains(r.system))
      .foreach(r => assert(r.peValidationLoss.isEmpty))
  }
}
