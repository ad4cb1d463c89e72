"""The market-concentration (HHI) query — §2.1, Listing 2, evaluated in
§7.1 / Figure 4 (our Table T2).

Three VFH companies each contribute a private trip book (companyID,
price); the query computes per-company revenue, market shares, and the
Herfindahl-Hirschman Index, revealed to party A. No trust annotations:
the query benefits purely from the §5.2 MPC-frontier push-down
(zero-fare filter + projection distributed per party, aggregation split
into local pre-aggregations and a tiny MPC combiner).
"""
from __future__ import annotations

import pandas as pd

from .. import synth_data
from ..core import dag as D
from ..core.columns import Column, Party
from ..core.lang import concat, newTable
from .base import QuerySpec

PARTY_NAMES = ["a", "b", "c"]


def build(n_parties: int = 3) -> QuerySpec:
    parties = [Party(p) for p in PARTY_NAMES[:n_parties]]
    schema = [Column("companyID"), Column("price")]
    inputs = [
        newTable(schema, at=p, name=f"taxi_{p.name}") for p in parties
    ]
    taxi = concat(inputs)
    rev = (
        taxi.filter("price", ">", 0)
        .project(["companyID", "price"])
        .aggregate("local_rev", D.SUM, group=["companyID"], over="price")
    )
    total = rev.aggregate("total_rev", D.SUM, over="local_rev")
    share = rev.cross(total).divide("m_share", "local_rev", by="total_rev")
    hhi = share.multiply("ms_squared", "m_share", "m_share").aggregate(
        "hhi", D.SUM, over="ms_squared"
    )
    out = hhi.collect(to=[parties[0]])
    union = " UNION ALL ".join(f"SELECT * FROM taxi_{p.name}" for p in parties)
    sql = f"""
        WITH trips AS ({union}),
        rev AS (
            SELECT companyID, SUM(price) AS local_rev
            FROM trips WHERE price > 0 GROUP BY companyID
        ),
        total AS (SELECT SUM(local_rev) AS total_rev FROM rev)
        SELECT SUM((local_rev * 1.0 / total_rev) * (local_rev * 1.0 / total_rev))
               AS hhi
        FROM rev, total
    """
    return QuerySpec(
        name="market_concentration",
        parties=parties,
        output=out,
        oracle_sql=sql,
        input_names=[f"taxi_{p.name}" for p in parties],
    )


def gen_inputs(*, n_per_party: int, n_companies: int = 3, seed: int = 0
               ) -> dict[str, pd.DataFrame]:
    return {
        f"taxi_{p}": synth_data.taxi_trips(
            n=n_per_party, n_companies=n_companies, seed=seed + i
        )
        for i, p in enumerate(PARTY_NAMES)
    }
