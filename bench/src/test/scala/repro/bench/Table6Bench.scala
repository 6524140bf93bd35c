package repro.bench

import repro.SparkSpec
import repro.exp.Tables

/** Reproduces paper Table 6: scaling the number of training examples on
  * movies (3 MDs, CFD violations), k_m ∈ {5, 2}. Shape: F1 is stable or
  * improves with more examples; time grows with the training-set size and
  * with k_m.
  */
class Table6Bench extends SparkSpec {
  test("Table 6: scaling training examples") {
    val rows = Tables.table6(spark)
    rows.foreach(r => info(f"km=${r.km}%2d #P/#N=${r.nPos}%4d/${r.nNeg}%4d F1=${r.f1}%.2f time=${r.timeMin}%.2fm"))

    for (km <- Seq(2, 5)) {
      val sweep = rows.filter(_.km == km).sortBy(_.nPos)
      assert(sweep.last.f1 >= sweep.head.f1 - 0.08,
        s"km=$km: F1 must not collapse as examples grow")
      assert(sweep.last.timeMin > sweep.head.timeMin,
        s"km=$km: learning time must grow with the training set")
    }
    val t5 = rows.filter(_.km == 5).map(_.timeMin).sum
    val t2 = rows.filter(_.km == 2).map(_.timeMin).sum
    assert(t5 > t2, "km=5 must be slower overall than km=2 (paper: 317m vs 5m at the top size)")
  }
}
