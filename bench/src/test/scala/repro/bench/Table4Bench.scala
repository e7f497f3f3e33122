package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces Table IV: EMD Globalizer (Aguilar-instantiated) vs the
  * HIRE-NER document-level baseline on all six annotated datasets.
  */
class Table4Bench extends SparkSpec {

  private lazy val rows = Experiments.table4(spark)

  private def byDataset = rows.groupBy(_.dataset).view.mapValues { rs =>
    (rs.find(_.system == "EMD Globalizer").get, rs.find(_.system == "HIRE-NER").get)
  }.toMap

  test("Table IV: effectiveness of Global EMD systems") {
    println("\n===== Table IV (measured) =====")
    println(Experiments.renderTable4(rows))
    println("\n===== Table IV (paper reference) =====")
    PaperNumbers.table4.toSeq.sortBy(_._1).foreach { case (d, (g, h)) =>
      println(f"$d%-8s EMD Globalizer P=${g._1}%4.2f R=${g._2}%4.2f F1=${g._3}%4.2f | " +
        f"HIRE-NER P=${h._1}%4.2f R=${h._2}%4.2f F1=${h._3}%4.2f")
    }
    assert(rows.size == 12)
  }

  test("EMD Globalizer outperforms HIRE-NER on F1 on every dataset") {
    byDataset.foreach { case (d, (glob, hire)) =>
      assert(glob.f1 > hire.f1, s"$d: globalizer=${glob.f1} hire=${hire.f1}")
    }
  }

  test("EMD Globalizer especially attains higher precision (paper observation)") {
    byDataset.foreach { case (d, (glob, hire)) =>
      assert(glob.p > hire.p, s"$d: globalizer P=${glob.p} hire P=${hire.p}")
    }
  }

  test("HIRE-NER is still a non-trivial baseline (F1 within a plausible band)") {
    byDataset.foreach { case (d, (_, hire)) =>
      assert(hire.f1 > 0.25 && hire.f1 < 0.9, s"$d: hire F1=${hire.f1}")
    }
  }
}
