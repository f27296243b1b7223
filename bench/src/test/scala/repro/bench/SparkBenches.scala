package repro.bench

import repro.SparkSpec
import repro.exp.{E10Tpch, E5Criteo}

/** Table T5 (fig. 6): marginal queries on the Criteo-like impression log. */
class E5CriteoBench extends SparkSpec {
  test("T5: marginal error falls with size; USS tracks priority sampling") {
    val rep = E5Criteo.run(spark)
    println(rep.table)
    // Error decreases with marginal size; the ≥ half-the-data bucket is tiny.
    val first = rep.rows.head
    val last = rep.rows.last
    assert(last.ussRrmse < first.ussRrmse,
      s"large marginals should beat small ones: ${last.ussRrmse} vs ${first.ussRrmse}")
    assert(last.ussRrmse < 0.01,
      s"paper: marginals over half the data have error well under 0.5%, got ${last.ussRrmse}")
    // USS stays in the same accuracy class as pre-aggregated priority sampling.
    val ussAll = rep.rows.map(_.ussRrmse).sum
    val priAll = rep.rows.map(_.priorityRrmse).sum
    assert(ussAll < 2.0 * priAll, s"USS=$ussAll priority=$priAll")
  }
}

/** Table T10 (§3): disaggregated per-order subset sums on TPC-H-lite. */
class E10TpchBench extends SparkSpec {
  test("T10: USS answers order-level filters about as well as pre-aggregated sampling") {
    val rep = E10Tpch.run(spark)
    println(rep.table)
    assert(rep("uss").rrmse < 0.5, s"USS error unusable: ${rep("uss")}")
    assert(rep("priority").rrmse < 0.5)
    assert(rep("uss").rrmse < 2.5 * rep("priority").rrmse,
      s"USS=${rep("uss").rrmse} priority=${rep("priority").rrmse}")
  }
}
