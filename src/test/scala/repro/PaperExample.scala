package repro

import repro.core.{CellHasher, Measure}
import repro.spindex.SpIndex

/** Fixture reproducing the paper's running example (Examples 3.1, 3.2, 4.1
  * and Figure 1) verbatim.
  *
  * Base spatial units L1..L4 map to ids 0..3; pat(L1)=pat(L2)=L5 (unit 0 at
  * level 1), pat(L3)=pat(L4)=L6 (unit 1); m = 2; times T1, T2 map to 0, 1.
  * `SpIndex.build(side=2, m=2, a=1, b=0)` produces exactly this hierarchy
  * (widths [2,4], equal-size parents over Morton-ordered children).
  */
object PaperExample {

  val sp: SpIndex = SpIndex.build(side = 2, m = 2, a = 1.0, b = 0.0)

  /** Example 3.2's hash table: table(u)((t, loc)). */
  val table: Array[Map[(Int, Int), Int]] = Array(
    Map((0, 0) -> 2, (1, 0) -> 8, (0, 1) -> 5, (1, 1) -> 1,
        (0, 2) -> 4, (1, 2) -> 6, (0, 3) -> 7, (1, 3) -> 3),
    Map((0, 0) -> 8, (1, 0) -> 3, (0, 1) -> 6, (1, 1) -> 5,
        (0, 2) -> 4, (1, 2) -> 1, (0, 3) -> 2, (1, 3) -> 7),
  )

  /** Hasher backed by the literal table; unit-level hashes roll up by min
    * over base descendants, per the paper's constraint.
    */
  val hasher: CellHasher = new CellHasher {
    val nh = 2
    val range = 9
    def unit(u: Int, level: Int, t: Int, unitId: Int): Int =
      if (level == sp.m) table(u)((t, unitId))
      else (0 until sp.nBase).filter(sp.ancestor(level, _) == unitId)
        .map(b => table(u)((t, b))).min
  }

  /** Entity traces of Example 3.2 (base cells (t, loc)). */
  val traces: Map[Long, Array[(Int, Int)]] = Map(
    0L -> Array((0, 1), (1, 0)), // e_a: {T1L2, T2L1}
    1L -> Array((0, 0), (1, 1)), // e_b: {T1L1, T2L2}
    2L -> Array((0, 2), (1, 0)), // e_c: {T1L3, T2L1}
    3L -> Array((0, 3), (1, 3)), // e_d: {T1L4, T2L4}
  )

  val eA = 0L; val eB = 1L; val eC = 2L; val eD = 3L

  /** Expected signature table of Example 3.2, layout (level-1)*nh + u.
    *
    * Note: the paper prints sig_d^2 = ⟨3, 7⟩, but by its own hash table and
    * definition sig_d^2[2] = min(h2(T1L4), h2(T2L4)) = min(2, 7) = 2 — an
    * arithmetic typo in the paper (every other entry checks out). We assert
    * the value implied by the definitions; the downstream consequence is
    * that e_d routes to sub-group 1 (not 2) at level 2.
    */
  val expectedSigs: Map[Long, Array[Int]] = Map(
    eA -> Array(1, 3, 5, 3),
    eB -> Array(1, 3, 1, 5),
    eC -> Array(1, 2, 4, 3),
    eD -> Array(3, 1, 3, 2),
  )

  /** Example 4.1's measure: 0.1·Dice(level 1) + 0.9·Dice(level 2). */
  val measure41: Measure = new Measure {
    val m = 2
    def degree(ov: Array[Int], sa: Array[Int], sb: Array[Int]): Double = {
      def dice(l: Int) = if (ov(l) == 0) 0.0 else 2.0 * ov(l) / (sa(l) + sb(l))
      0.1 * dice(0) + 0.9 * dice(1)
    }
  }
}
