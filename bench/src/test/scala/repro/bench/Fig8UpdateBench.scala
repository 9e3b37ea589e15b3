package repro.bench

import repro.SparkSpec
import repro.core.Signatures
import repro.exp.Harness
import repro.mobility.ImModel

/** Figure 8 (§6.8): update cost vs n_h when 100% / 70% / 40% of the updated
  * entities already exist in the index (the rest are new inserts).
  *
  * Paper claims: update time grows linearly with n_h; inserting new
  * entities is cheaper than modifying existing ones (no locate+remove).
  */
class Fig8UpdateBench extends SparkSpec {

  test("Figure 8: update cost vs n_h for 100%/70%/40% existing entities") {
    val (sp, cells) = BenchData.syn
    val nhs = Seq(8, 32, 128, 512)
    val shares = Seq(1.0, 0.7, 0.4)
    val nUpdates = (BenchData.NEntities / 10).toInt // update 10% of entities

    // Pre-simulate the new traces once (generation is not part of the cost).
    val newTraces = (0 until nUpdates).map { i =>
      ImModel.simulate(900000L + i, BenchData.Side,
        repro.mobility.ImParams(horizon = BenchData.Horizon), seed = 77)
    }

    val rows = nhs.map { nh =>
      val perShare = shares.map { share =>
        val built = Harness.build(spark, sp, cells, nh)
        val tree = built.tree
        val existing = built.store.entities.toSeq.sorted.take((nUpdates * share).toInt)
        val newcomers = (0 until nUpdates - existing.size).map(i => 800000L + i)
        val t0 = System.nanoTime()
        existing.zipWithIndex.foreach { case (e, i) =>
          tree.update(e, Signatures.computeLocal(newTraces(i), sp, built.hasher))
        }
        newcomers.zipWithIndex.foreach { case (e, i) =>
          tree.insert(e, Signatures.computeLocal(newTraces(existing.size + i), sp, built.hasher))
        }
        (System.nanoTime() - t0) / 1e6
      }
      (nh, perShare)
    }

    Harness.printTable(
      s"Figure 8 — time (ms) to update $nUpdates entities vs n_h [paper: linear in n_h; new < existing]",
      Seq("n_h") ++ shares.map(s => s"${(s * 100).toInt}% existing"),
      rows.map { case (nh, ts) => Seq(nh.toString) ++ ts.map(t => f"$t%.0f") })

    // Crisp claims: cost grows with n_h; a lower share of existing entities
    // is not more expensive (insert <= update) at the largest n_h.
    val t100 = rows.map(_._2.head)
    assert(t100.last > t100.head, s"update time should grow with n_h: $t100")
    val atMax = rows.last._2
    assert(atMax.last <= atMax.head * 1.25,
      s"40% existing should not cost more than 100% existing: $atMax")
  }
}
