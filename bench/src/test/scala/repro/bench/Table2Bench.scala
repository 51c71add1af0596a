package repro.bench

import repro.SparkSpec
import repro.data.Catalog
import repro.jobs.Table2Job

/** Reproduces Table 2 (dataset statistics): generates every analog, prints
  * its measured stats next to the paper's published ones, and asserts the
  * analogs hit their configured shapes.
  */
class Table2Bench extends SparkSpec {

  test("Table 2: dataset statistics of the 10 analogs") {
    val lines = Table2Job.statsLines(spark, Catalog.all)
    println("==== Table 2 (measured vs paper) ====")
    lines.foreach(println)
    assert(lines.size == 10)
  }

  Catalog.all.foreach { spec =>
    test(s"Table 2: ${spec.name} analog matches its configured shape") {
      val g = spec.generate(spark)
      val e = g.edges.cache()
      assert(e.select("u").distinct().count() == spec.cfg.nU)
      assert(e.select("v").distinct().count() == spec.cfg.nV)
      val edges = e.count()
      assert(edges > spec.cfg.targetEdges / 2,
        s"${spec.name}: only $edges edges vs target ${spec.cfg.targetEdges}")
      val weighted = e.select("w").distinct().count() > 1
      assert(weighted == spec.cfg.weighted || !spec.cfg.weighted,
        s"${spec.name}: weightedness mismatch")
      if (spec.cfg.weighted) assert(weighted, s"${spec.name}: expected weighted")
      e.unpersist()
    }
  }
}
