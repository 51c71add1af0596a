package repro.baselines

import repro.{SparkSpec, TestGraphs}
import repro.core.Metrics

/** Every competitor returns a valid partition and clears a quality floor
  * appropriate to its strength on an easy planted instance (the weak methods
  * in the paper — GN, LE — only need to beat "random-ish").
  */
class BaselinesSpec extends SparkSpec {

  private lazy val sp = spark

  private lazy val easy = TestGraphs.easy(sp)
  private def k = easy.config.k
  private def nU = easy.config.nU

  /** (method, minimum ARI demanded on the easy instance). */
  private val expectations: Seq[(Baseline, Double)] = Seq(
    SpectralBaselines.SC            -> 0.5,
    SpectralBaselines.SCC           -> 0.5,
    SpectralBaselines.SBC           -> 0.02, // weak in the paper too (Table 4)
    DataClustering.KMeansBaseline   -> 0.5,
    DataClustering.KMedoidsBaseline -> 0.1,
    DataClustering.BirchBaseline    -> 0.3,
    NmfBaseline                     -> 0.05, // mediocre in the paper too
    RandomWalkEmb.PPR               -> 0.5,
    RandomWalkEmb.NRP               -> 0.2,
    BiSbm.KL                        -> 0.5,
    BiSbm.MCMC                      -> 0.3,
    LeadingEigenvectorBaseline      -> -0.1,
    GirvanNewmanBaseline            -> -0.1,
  )

  expectations.foreach { case (m, minAri) =>
    test(s"${m.name}: valid partition and ARI > $minAri on the easy instance") {
      val assign = m.cluster(sp, easy.edges, k, seed = 11)
      val rows = assign.collect()
      assert(rows.length == nU, s"${m.name}: ${rows.length} assignments for $nU vertices")
      rows.foreach { r =>
        val c = r.getInt(1)
        assert(c >= 0 && c < k, s"${m.name}: cluster $c out of range")
      }
      val s = Metrics.evaluate(assign, easy.uLabels)
      info(s"${m.name}: $s")
      assert(s.ari > minAri, s"${m.name} scores: $s")
    }
  }

  test("registry enumerates 16 methods in table order") {
    assert(Registry.all.size == 16)
    assert(Registry.competitors.size == 13)
    assert(Registry.ours.map(_.name) ==
      Seq("HOPE", "HOPE+ (FNEM)", "HOPE+ (SNEM)"))
    assert(Registry.byName("NMF").name == "NMF")
  }

  test("our methods (via registry) beat every competitor floor on easy input") {
    Registry.ours.foreach { m =>
      val s = Metrics.evaluate(m.cluster(sp, easy.edges, k, seed = 11), easy.uLabels)
      info(s"${m.name}: $s")
      assert(s.ari > 0.8, s"${m.name} scores: $s")
    }
  }

  test("feasibility gates mirror the paper's '-' cells") {
    import repro.data.Catalog
    def feasibleOn(m: Baseline, s: Catalog.Spec) = m.feasible(s.paperEdgeCount, s.cfg.k)
    // GN only on CORA and CiteSeer (Table 4).
    assert(feasibleOn(GirvanNewmanBaseline, Catalog.cora))
    assert(feasibleOn(GirvanNewmanBaseline, Catalog.citeseer))
    assert(!feasibleOn(GirvanNewmanBaseline, Catalog.flickr))
    // LE populated through CORA-F, "-" from LastFM (Asia) on (Table 5).
    assert(feasibleOn(LeadingEigenvectorBaseline, Catalog.coraF))
    assert(!feasibleOn(LeadingEigenvectorBaseline, Catalog.lastFmAsia))
    // BiSBM-KL: "-" on CORA-F (k=70) but populated on LastFM (Asia).
    assert(!feasibleOn(BiSbm.KL, Catalog.coraF))
    assert(feasibleOn(BiSbm.KL, Catalog.lastFmAsia))
    // Only NMF, NRP and ours survive MIND/LastFM/MAG (Table 5).
    Seq(Catalog.mind, Catalog.lastFm, Catalog.mag).foreach { s =>
      val survivors = Registry.all.filter(feasibleOn(_, s)).map(_.name).toSet
      assert(survivors == Set("NMF", "NRP", "HOPE", "HOPE+ (FNEM)", "HOPE+ (SNEM)"),
        s"${s.name}: $survivors")
    }
  }
}
