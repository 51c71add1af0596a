package repro.bench

import repro.SparkSpec
import repro.data.Catalog
import repro.eval.TableRunner

/** Reproduces Table 4: clustering quality of all 16 methods on the 5 small
  * dataset analogs. Asserts the SHAPE of the paper's result — our methods
  * rank at the top and HOPE+ (SNEM) leads — not absolute numbers (the data
  * is synthetic; see EXPERIMENTS.md for the side-by-side).
  */
class Table4Bench extends SparkSpec {

  private lazy val result = TableRunner.run(spark, Catalog.small)

  test("Table 4: run all methods on the 5 small datasets and print the table") {
    println("==== Table 4 (measured; paper values in parentheses) ====")
    println(result.render(PaperNumbers.table4))
    // Every (method, dataset) cell was attempted.
    assert(result.cells.size == 16 * 5)
  }

  test("Table 4 shape: our three methods take the top-3 average ranks") {
    val ranks = result.avgRank
    val ours = Set("HOPE", "HOPE+ (FNEM)", "HOPE+ (SNEM)")
    val top3 = ranks.toSeq.sortBy(_._2).take(3).map(_._1).toSet
    println(s"[Table4] avg ranks: ${ranks.toSeq.sortBy(_._2).map { case (m, r) => f"$m=$r%.2f" }.mkString(", ")}")
    assert(top3 == ours, s"top-3 ranks were $top3")
  }

  test("Table 4 shape: HOPE+ (SNEM) beats every competitor's accuracy on most datasets") {
    val wins = result.datasets.count { d =>
      val snem = result.cells(("HOPE+ (SNEM)", d)).scores.get.acc
      val bestComp = result.methods.filterNot(Set("HOPE", "HOPE+ (FNEM)", "HOPE+ (SNEM)"))
        .flatMap(m => result.cells.get((m, d)).flatMap(_.scores).map(_.acc)).max
      snem >= bestComp
    }
    assert(wins >= 4, s"SNEM won accuracy on only $wins/5 small datasets")
  }

  test("Table 4 shape: Girvan-Newman only populates CORA and CiteSeer") {
    val populated = result.datasets.filter(d =>
      result.cells(("Girvan-Newman", d)).scores.isDefined)
    assert(populated.toSet == Set("CORA", "CiteSeer"), populated.toString)
  }
}
