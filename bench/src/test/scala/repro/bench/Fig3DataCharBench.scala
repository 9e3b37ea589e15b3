package repro.bench

import repro.SparkSpec
import repro.exp.{Harness, Workloads}
import repro.mobility.ImParams

/** Figure 3 (§6.4): PE sensitivity to the hierarchical-IM-model parameters.
  * One parameter varies per sweep; the rest stay at the "normal mobility"
  * values (α=0.6, β=0.8, γ=0.2, ζ=1.2, ρ=0.6, a=2, b=2, m=4).
  *
  * Paper claims per panel:
  *  (a) α: descending (more locality → better pruning)
  *  (b) β: flat (PI duration does not matter once split into ST-cells)
  *  (c) ρ: ascending   (d) γ: descending, steeper than ρ
  *  (e) ζ: descending  (f) a: flat  (g) b: flat
  *  (h) m: ascending (more levels → more AjPIs → more search space)
  */
class Fig3DataCharBench extends SparkSpec {

  // Reduced scale per sweep point so 24 dataset builds stay fast.
  private val N = 4000L
  private val Side = 32
  private val Horizon = 120
  private val Nh = 128
  private val ks = Seq(1, 10, 50)

  private def peFor(im: ImParams, a: Double = 2.0, b: Double = 2.0, m: Int = 4): Seq[Double] = {
    val (sp, cells) = Workloads.syn(spark, Workloads.SynConfig(
      nEntities = N, side = Side, m = m, a = a, b = b, im = im))
    val (built, searcher, queries) = BenchData.pipeline(sp, cells, Nh)
    ks.map(k => Harness.measurePe(searcher, built.store, queries, k).avgPe)
  }

  private def table(panel: String, param: String, values: Seq[Double], rows: Seq[Seq[Double]], claim: String): Unit = {
    Harness.printTable(
      s"Figure 3($panel) — PE vs $param [paper claim: $claim]",
      Seq(param) ++ ks.map(k => s"Top-$k"),
      values.zip(rows).map { case (v, r) => Seq(v.toString) ++ r.map(Harness.f) })
  }

  private val im = ImParams(horizon = Horizon)

  test("Figure 3(a): alpha sweep (jump locality)") {
    val vs = Seq(0.3, 0.6, 1.2)
    val rows = vs.map(a => peFor(im.copy(alpha = a)))
    table("a", "alpha", vs, rows, "descending")
  }

  test("Figure 3(b): beta sweep (stay duration) — expected flat") {
    val vs = Seq(0.4, 0.8, 1.6)
    val rows = vs.map(b => peFor(im.copy(beta = b)))
    table("b", "beta", vs, rows, "flat")
    // Crisp claim: variation across beta is small relative to PE scale.
    val byK = ks.indices.map(i => rows.map(_(i)))
    byK.foreach { series =>
      assert(series.max - series.min < 0.25, s"beta sweep should be ~flat: $series")
    }
  }

  test("Figure 3(c): rho sweep (exploration scale)") {
    val vs = Seq(0.2, 0.6, 1.0)
    val rows = vs.map(r => peFor(im.copy(rho = r)))
    table("c", "rho", vs, rows, "ascending")
  }

  test("Figure 3(d): gamma sweep (exploration decay)") {
    val vs = Seq(0.05, 0.2, 0.8)
    val rows = vs.map(g => peFor(im.copy(gamma = g)))
    table("d", "gamma", vs, rows, "descending")
  }

  test("Figure 3(e): zeta sweep (visit-frequency skew)") {
    val vs = Seq(0.6, 1.2, 2.4)
    val rows = vs.map(z => peFor(im.copy(zeta = z)))
    table("e", "zeta", vs, rows, "descending")
  }

  test("Figure 3(f): a sweep (hierarchy width) — expected flat") {
    val vs = Seq(1.0, 1.5, 2.0)
    val rows = vs.map(a => peFor(im, a = a))
    table("f", "a", vs, rows, "flat")
    val byK = ks.indices.map(i => rows.map(_(i)))
    byK.foreach(series => assert(series.max - series.min < 0.25, s"a sweep should be ~flat: $series"))
  }

  test("Figure 3(g): b sweep (hierarchy density) — expected flat") {
    val vs = Seq(0.5, 1.0, 2.0)
    val rows = vs.map(b => peFor(im, b = b))
    table("g", "b", vs, rows, "flat")
    val byK = ks.indices.map(i => rows.map(_(i)))
    byK.foreach(series => assert(series.max - series.min < 0.25, s"b sweep should be ~flat: $series"))
  }

  test("Figure 3(h): m sweep (hierarchy depth)") {
    val vs = Seq(1, 2, 4)
    val rows = vs.map(m => peFor(im, m = m))
    table("h", "m", vs.map(_.toDouble), rows,
      "ascending — DEVIATES here: measured descending, see EXPERIMENTS.md")
    // Our measured trend is the *inverse* of the paper's: every extra
    // level adds an independent pruning hash to each root-leaf path, which
    // at this scale outweighs the growth in coarse-level AjPIs the paper
    // attributes the ascending trend to. Assert the robust part only: m
    // strongly affects PE.
    val top10 = rows.map(_(1))
    assert((top10.max - top10.min) > 0.02, s"m should matter: $top10")
  }
}
