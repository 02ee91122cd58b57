package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.algebra._
import repro.core.stats._

/** Pure unit tests of the cardinality estimator and TvrStats. */
class StatsSpec extends AnyFunSuite {
  private val r = RelStats(1000, Map("k" -> 100.0, "g" -> 10.0))

  test("TvrStats snapshots accumulate deltas") {
    val ts = TvrStats(Vector(100, 50, 25), Map("k" -> 60.0))
    assert(ts.snapRows(0) == 100 && ts.snapRows(1) == 150 && ts.snapRows(2) == 175)
    assert(ts.totalRows == 175)
    assert(ts.deltaStats(0, 1).rows == 50)
    assert(ts.deltaStats(0, 2).rows == 75)
    assert(ts.snapStats(0).d("k") <= 60.0)
  }

  test("filter selectivity is multiplicative and bounded") {
    val p = And(Cmp("=", Col("k"), Lit(1L)), Cmp("<", Col("g"), Lit(5L)))
    val sel = Estimator.selectivity(p)
    assert(sel > 0 && sel < Estimator.selectivity(Cmp("=", Col("k"), Lit(1L))))
    assert(Estimator.selectivity(Or(Lit(true), Lit(true))) <= 1.0)
    assert(Estimator.filter(r, p).rows < r.rows)
  }

  test("inner join cardinality uses the larger key domain") {
    val l = RelStats(1000, Map("k" -> 100.0)); val s = RelStats(500, Map("j" -> 500.0))
    val out = Estimator.join(l, s, Inner, Seq("k"), Seq("j"))
    assert(math.abs(out.rows - 1000.0 * 500 / 500) < 1e-6)
  }

  test("left outer join returns at least the left cardinality") {
    val l = RelStats(1000, Map("k" -> 1000.0)); val s = RelStats(10, Map("j" -> 10.0))
    assert(Estimator.join(l, s, LeftOuter, Seq("k"), Seq("j")).rows >= 1000)
  }

  test("semi + anti partition the left side") {
    val l = RelStats(1000, Map("k" -> 100.0)); val s = RelStats(500, Map("j" -> 50.0))
    val semi = Estimator.join(l, s, LeftSemi, Seq("k"), Seq("j")).rows
    val anti = Estimator.join(l, s, LeftAnti, Seq("k"), Seq("j")).rows
    assert(math.abs(semi + anti - l.rows) < 1e-6)
    assert(semi > 0 && anti >= 0)
  }

  test("aggregate output is bounded by input rows and key domain") {
    val out = Estimator.agg(r, Seq("g"))
    assert(out.rows == 10.0)
    assert(Estimator.agg(r, Seq("k", "g")).rows <= r.rows)
    assert(Estimator.agg(r, Nil).rows == 1.0)
  }

  test("union adds rows and maxes distincts") {
    val out = Estimator.unionAll(Seq(r, r))
    assert(out.rows == 2000 && out.d("g") == 10.0)
  }

  test("distinct defaults are sane for unknown columns") {
    assert(r.d("unknown") >= 1.0 && r.d("unknown") <= r.rows)
    assert(RelStats.empty.d("x") == 1.0)
  }
}
