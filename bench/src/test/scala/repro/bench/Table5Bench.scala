package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 5 reproduction: lines of code per relational operator. The claim
  * under test: the tensor formulation needs a small fraction of the code of
  * the specialized engines (paper: up to 10× less than CPU systems, 50×
  * less than GPU ones), with one implementation covering all hardware.
  */
class Table5Bench extends AnyFunSuite {

  test("Table 5: operator lines of code") {
    val rows = Table5Runner.run()
    Table5Runner.print(rows)

    val ours  = rows.find(_.system.startsWith("TQP-repro")).get
    val spark = rows.find(_.system.startsWith("Spark")).get
    val duck  = rows.find(_.system.startsWith("DuckDB")).get
    val omni  = rows.find(_.system.startsWith("OmnisciDB")).get

    // Same ballpark as the paper's TQP (tensor programs are compact).
    assert(ours.hashJoin.get < 300 && ours.sortJoin.get < 300 && ours.aggregation.get < 400)
    // At least ~3× less code than the CPU baselines, ~10× less than Omnisci.
    assert(ours.hashJoin.get * 3 < duck.hashJoin.get)
    assert(ours.sortJoin.get * 3 < spark.sortJoin.get)
    assert(ours.hashJoin.get * 10 < omni.hashJoin.get)
  }
}
