package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.baselines.BruteForce
import scala.util.Random

/** Executes the Appendix B reduction MCP → CJSP on concrete instances:
  * solving the constructed CJSP instance optimally must solve the original
  * MCP instance optimally, which is what makes CJSP NP-hard.
  */
class NpReductionSpec extends AnyFunSuite {

  /** Exhaustive MCP optimum (tiny instances only). */
  private def mcpOptimal(sets: Seq[Set[Int]], k: Int): Int =
    sets.indices.toSeq.combinations(k).map(_.flatMap(sets).toSet.size).maxOption.getOrElse(0)

  for (seed <- 0 until 6) {
    test(s"MCP→CJSP reduction preserves the optimum (seed=$seed)") {
      val rnd = new Random(seed)
      val theta = 3 // grid 8×8 = 64 > |U|
      val uSize = 3 + rnd.nextInt(10)
      val nSets = 4 + rnd.nextInt(5)
      val k = 2
      // Random MCP instance over universe {0..uSize-1}.
      val sets = Seq.fill(nSets)(
        (0 until uSize).filter(_ => rnd.nextBoolean()).toSet
      ).map(s => if (s.isEmpty) Set(rnd.nextInt(uSize)) else s)
      // Reduction: map element i to cell ID i; query = all other cell IDs;
      // δ = 2^θ·√2 makes every pair of datasets connected.
      val allCells = (0L until (1L << (2 * theta))).toArray
      val mapped = sets.zipWithIndex.map { case (s, i) =>
        i -> CellSet.of(s.map(_.toLong))
      }
      val query = CellSet.of(allCells.filterNot(c => c < uSize))
      val delta = (1 << theta) * math.sqrt(2)
      val cjsp = BruteForce.coverageOptimal(mapped, query, delta, k)
      val mcpOpt = mcpOptimal(sets, k)
      // CJSP coverage = |query| + covered MCP elements.
      assert(cjsp.coverage - query.length == mcpOpt,
             s"CJSP gives ${cjsp.coverage - query.length}, MCP optimum is $mcpOpt")
    }
  }

  test("δ = 2^θ·√2 connects every pair of datasets in the grid") {
    val theta = 3
    val delta = (1 << theta) * math.sqrt(2)
    val a = CellSet.of(Seq(Grid.interleave(0, 0)))
    val b = CellSet.of(Seq(Grid.interleave(7, 7)))
    assert(CellSet.connected(a, b, delta))
  }
}
