"""The SMCQL *comorbidity* query — §7.4 / Figure 7b (our Table T6).

Two hospitals hold diagnosis events; the query counts occurrences per
(private) diagnosis code and returns the top-10. Both Conclave and
SMCQL split the aggregation into local pre-aggregation plus an MPC
combiner (§5.2); the MPC part then sorts by count and limits. The
performance difference in the paper comes from the MPC backend
(Sharemind vs ObliVM), reproduced by running the same plan on both
simulated backends.
"""
from __future__ import annotations

import pandas as pd

from .. import synth_data
from ..core import dag as D
from ..core.columns import Column, Party
from ..core.lang import concat, newTable
from .base import QuerySpec

TOP_K = 10


def build() -> QuerySpec:
    h1, h2 = Party("h1"), Party("h2")
    schema = lambda: [Column("diag")]  # noqa: E731
    diags = concat(
        [
            newTable(schema(), at=h1, name="cdiag_h1"),
            newTable(schema(), at=h2, name="cdiag_h2"),
        ]
    )
    top = (
        diags.aggregate("cnt", D.COUNT, group=["diag"])
        .sort_by("cnt", ascending=False)
        .limit(TOP_K)
    )
    out = top.collect(to=[h1, h2])
    sql = f"""
        WITH diags AS (SELECT * FROM cdiag_h1 UNION ALL SELECT * FROM cdiag_h2)
        SELECT diag, COUNT(*) AS cnt
        FROM diags GROUP BY diag
        ORDER BY cnt DESC, diag
        LIMIT {TOP_K}
    """
    return QuerySpec(
        name="comorbidity",
        parties=[h1, h2],
        output=out,
        oracle_sql=sql,
        input_names=["cdiag_h1", "cdiag_h2"],
    )


def gen_inputs(*, n_per_party: int, distinct_key_frac: float = 0.1, seed: int = 0
               ) -> dict[str, pd.DataFrame]:
    return {
        "cdiag_h1": synth_data.comorbidity_diagnoses(
            n=n_per_party, distinct_key_frac=distinct_key_frac, seed=seed
        ),
        "cdiag_h2": synth_data.comorbidity_diagnoses(
            n=n_per_party, distinct_key_frac=distinct_key_frac, seed=seed + 1
        ),
    }
