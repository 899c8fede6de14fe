package repro.exp

import org.scalatest.funsuite.AnyFunSuite

/** Smoke tests for the experiment harness at tiny scale — the full-scale runs
  * live in `bench/` (one suite per paper table).
  */
class ExpHarnessSpec extends AnyFunSuite {

  test("TableFormat renders aligned rows") {
    val s = TableFormat.render("T", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("333", "4")))
    val lines = s.split("\n")
    assert(lines.head == "== T ==")
    assert(lines.drop(1).map(_.length).distinct.length == 1, "all rows same width")
  }

  test("TableFormat.fmt: NaN → '*', small → '-', else 2 decimals") {
    assert(TableFormat.fmt(Double.NaN) == "*")
    assert(TableFormat.fmt(0.001) == "-")
    assert(TableFormat.fmt(0.5) == "0.50")
  }

  test("Workloads: eps positive, MinPts = 10 everywhere (paper Section 5.2)") {
    val ws = Seq(Workloads.moons(0.05), Workloads.cancer(0.2), Workloads.colaText(0.2))
    ws.foreach { w =>
      assert(w.eps > 0, s"${w.name} eps")
      assert(w.minPts == 10)
      assert(w.trueK >= 2)
    }
  }

  test("Workloads: scale shrinks n") {
    assert(Workloads.moons(0.05).n < Workloads.moons(0.25).n)
  }

  test("Table1 inventory at tiny scale: 15 datasets, 4 non-Euclidean") {
    val rows = Table1.run(scale = 0.05)
    assert(rows.length == 15)
    assert(rows.count(_.dims == "n/a") == 4)
    assert(rows.forall(_.n > 0))
    assert(Table1.render(rows).contains("Moons"))
  }

  test("Table2 at tiny scale: proportions in [0,1], render works") {
    val rows = Table2.run(scale = 0.05)
    assert(rows.length == 11)
    rows.foreach { r =>
      assert(r.proportion >= 0.0 && r.proportion <= 1.0)
      assert(r.totalMs >= r.gonzalezMs)
    }
    assert(Table2.render(rows).nonEmpty)
  }

  test("Fig6 at tiny scale: footprints positive and ≤ n") {
    val rows = Fig6Memory.run(scale = 0.05, rhos = Seq(1.0, 2.0))
    rows.foreach { r =>
      assert(r.footprint > 0 && r.footprint <= r.n)
      assert(r.ratio > 0 && r.ratio <= 1.0)
    }
  }

  test("Fig3 at tiny scale: every algorithm measured on every dataset class") {
    val rows = Fig3Runtime.run(scale = 0.04, epsFactors = Seq(1.0))
    assert(rows.forall(_.millis >= 0))
    val byDs = rows.groupBy(_.dataset)
    assert(byDs.keySet == Set("Moons", "MNIST", "AG_News", "Spotify_like"))
    // GT grids only on the 2D dataset
    assert(byDs("Moons").exists(_.algo == "GT_Exact"))
    assert(!byDs("MNIST").exists(_.algo == "GT_Exact"))
    // the metric-space algorithms run on the edit-distance dataset
    assert(byDs("AG_News").map(_.algo).toSet ==
      Set("Our_Exact", "Our_Approx", "DBSCAN", "DBSCAN++", "DYW_DBSCAN"))
  }

  test("Table4.evalOne at tiny scale produces scores in [-1, 1]") {
    val row = Table4.evalOne(Workloads.cancer(0.2), rho = 0.5)
    Seq(row.ours, row.dbStream, row.dStream, row.evoStream, row.bico).foreach { s =>
      assert(s.ari >= -1.0 && s.ari <= 1.0)
      assert(s.ami >= -1.0 && s.ami <= 1.0 + 1e-9)
    }
  }
}
