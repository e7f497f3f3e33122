package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces Table I: dataset statistics of the seven Twitter datasets
  * (synthetic substitutes, see DESIGN.md). Prints measured vs paper sizes.
  */
class Table1Bench extends SparkSpec {

  private lazy val rows = Experiments.table1(spark)

  test("Table I: dataset statistics") {
    println("\n===== Table I (measured) =====")
    println(Experiments.renderTable1(rows))
    println("\nPaper tweet counts: " + PaperNumbers.table1Tweets.toSeq.sortBy(_._1).map {
      case (d, n) => s"$d=$n"
    }.mkString(", "))
    assert(rows.size == 7)
  }

  test("tweet counts match the paper's dataset sizes exactly") {
    rows.foreach { r =>
      assert(r.nTweets == PaperNumbers.table1Tweets(r.dataset),
        s"${r.dataset}: ${r.nTweets} != ${PaperNumbers.table1Tweets(r.dataset)}")
    }
  }

  test("streaming datasets D1–D4 hold ~2306 unique entities (error-analysis total)") {
    val streamingEntities = rows.filter(r => Set("D1", "D2", "D3", "D4").contains(r.dataset))
      .map(_.nEntities).sum
    assert(streamingEntities > 1600 && streamingEntities < 3000,
      s"streaming unique entities=$streamingEntities (paper: 2306)")
  }

  test("streaming datasets D1–D4 hold ~11412 mentions (error-analysis total)") {
    val mentions = rows.filter(r => Set("D1", "D2", "D3", "D4").contains(r.dataset))
      .map(_.nMentions).sum
    assert(mentions > 9000 && mentions < 14000, s"mentions=$mentions (paper: 11412)")
  }

  test("D5 mentions ~7000 unique entities (paper: ≈7000)") {
    val d5 = rows.find(_.dataset == "D5").get
    assert(d5.nEntities > 5000 && d5.nEntities < 9000, s"D5 entities=${d5.nEntities}")
  }

  test("streaming datasets repeat entities more than non-streaming ones") {
    val streaming = rows.filter(_.streaming).map(_.mentionsPerEntity)
    val nonStreaming = rows.filterNot(_.streaming).map(_.mentionsPerEntity)
    assert(streaming.min > nonStreaming.max,
      s"streaming M/E=${streaming.mkString(",")} non-streaming M/E=${nonStreaming.mkString(",")}")
  }
}
