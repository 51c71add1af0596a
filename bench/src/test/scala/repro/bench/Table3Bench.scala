package repro.bench

import repro.SparkSpec
import repro.{TestGraphs}
import repro.baselines.Registry
import repro.core.Metrics

/** Reproduces Table 3 (evaluated methods + complexities): prints the method
  * roster with the paper's asymptotic complexity strings and smoke-runs every
  * one of the 16 algorithms on a tiny planted graph so the roster is not just
  * a list but a set of runnable implementations.
  */
class Table3Bench extends SparkSpec {

  test("Table 3: all 16 methods enumerated with complexities") {
    println("==== Table 3 (implemented methods) ====")
    Registry.withComplexity.foreach { case (m, cx) =>
      println(f"${m.name}%-16s $cx")
    }
    assert(Registry.withComplexity.size == 16)
  }

  test("Table 3: every method executes end-to-end on a small instance") {
    val g = TestGraphs.easy(spark)
    Registry.all.foreach { m =>
      val assign = m.cluster(spark, g.edges, g.config.k, seed = 1)
      val s = Metrics.evaluate(assign, g.uLabels)
      println(f"[Table3] ${m.name}%-16s $s")
      assert(assign.count() == g.config.nU, s"${m.name} dropped vertices")
    }
  }
}
