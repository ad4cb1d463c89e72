"""Table T2 — §7.1 Figure 4: the market-concentration (HHI) query.

Three systems over growing per-party trip counts:

* **conclave** — full compiler (frontier push-down + aggregation split):
  all heavy lifting in local Spark jobs, a few rows under MPC;
* **sharemind** — the whole query under secret-sharing MPC (push-down
  disabled), which dies in the ~100k regime like the paper's baseline;
* **insecure spark** — the query in the clear on the unioned data.

The paper runs to 1.3 B rows on a 9-node cluster; we sweep to 1 M rows
per party (3 M total) on one box — Conclave's curve is linear in input
size in both, so the shape comparison holds.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from ..backends.spark_clear import run_query_clear
from ..bench_util import Point, run_point
from ..core.compiler import CompileOptions, compile_query
from ..mpc.accounting import Meter
from ..queries import market_concentration as Q
from ..queries.base import gen_to_spark
from ..runtime.engine import Engine

FULL_NS = {
    "conclave": [1000, 10_000, 100_000, 1_000_000],
    "sharemind": [1000, 10_000, 100_000],
    "insecure-spark": [1000, 10_000, 100_000, 1_000_000],
}
QUICK_NS = {
    "conclave": [1000, 10_000],
    "sharemind": [1000, 10_000],
    "insecure-spark": [1000, 10_000],
}


def _run_system(spark: SparkSession, system: str, n_per_party: int) -> Meter:
    gen = Q.gen_inputs(n_per_party=n_per_party)
    spec = Q.build()
    data = gen_to_spark(spark, gen)
    if system == "insecure-spark":
        meter = Meter()
        run_query_clear(spark, spec.output, data).collect()
        return meter
    opts = CompileOptions(
        parties=spec.parties,
        allow_cardinality_leaking_pushdown=(system == "conclave"),
        enable_push_up=(system == "conclave"),
    )
    plan = compile_query(spec.output, opts)
    eng = Engine(spark, [p.name for p in spec.parties])
    eng.run(plan, data).collect()
    return eng.meter


def run(spark: SparkSession, *, quick: bool = False) -> list[Point]:
    ns = QUICK_NS if quick else FULL_NS
    points: list[Point] = []
    for system, sizes in ns.items():
        for n in sizes:
            points.append(run_point(system, n, lambda: _run_system(spark, system, n)))
    return points
