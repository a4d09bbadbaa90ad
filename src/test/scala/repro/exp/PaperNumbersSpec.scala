package repro.exp

import org.scalatest.funsuite.AnyFunSuite

/** Internal consistency of the transcribed paper numbers — typos here would
  * silently corrupt every paper-vs-ours comparison.
  */
class PaperNumbersSpec extends AnyFunSuite {

  test("tables 1 and 2 cover the five evaluation corpora") {
    assert(PaperNumbers.table1.keySet == Set("customer1", "customer2", "customer3"))
    assert(PaperNumbers.table2.keySet == Set("tableUnion", "kaggle"))
  }

  test("incorrect-edge counts decrease monotonically in every paper row") {
    (PaperNumbers.table1 ++ PaperNumbers.table2).values.foreach { e =>
      assert(e.sgbIncorrect >= e.mmpIncorrect && e.mmpIncorrect >= e.clpIncorrect)
    }
  }

  test("table 3: pipeline stages are cheaper than their brute-force counterparts") {
    PaperNumbers.table3.values.foreach { o =>
      assert(o.gtContent > o.clp && o.gtContent > o.mmp)
    }
  }

  test("table 4: SGB dominates both baselines with zero misses") {
    PaperNumbers.table4.values.foreach { b =>
      assert(b.sgb._2 == 0)
      assert(b.sgb._1 >= b.bharadwaj._1 && b.sgb._1 >= b.kmeans._1)
      assert(b.kmeans._2 > b.bharadwaj._2, "KMeans misses most in the paper")
    }
  }

  test("table 6: paper numbers improve monotonically with s and t") {
    for (t <- Seq(5, 10, 30)) {
      assert(PaperNumbers.table6((1, t)) > PaperNumbers.table6((4, t)))
      assert(PaperNumbers.table6((4, t)) >= PaperNumbers.table6((8, t)))
    }
    for (s <- Seq(1, 4, 8)) {
      assert(PaperNumbers.table6((s, 5)) >= PaperNumbers.table6((s, 10)))
      assert(PaperNumbers.table6((s, 10)) >= PaperNumbers.table6((s, 30)))
    }
  }

  test("table 7: retention edges equal deleted nodes in the paper rows") {
    PaperNumbers.table7.values.foreach(o => assert(o.retEdges == o.delNodes))
  }
}
