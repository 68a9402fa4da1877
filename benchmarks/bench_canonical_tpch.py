"""Benchmark: canonicalization/provenance operators on TPC-H-lite at SF=0.1.

Explain3D's paper has no TPC-H workload; this bench uses the provided
``repro.synth_data`` generators to stress the stage-1 Catalyst plans
(provenance extraction + canonicalization groupBy) at ~600K rows, with a
DuckDB oracle check guarding correctness (see tests/test_tpch_oracle.py
for the SF=0.01 equivalence test).
"""
import pytest

from repro import synth_data
from repro.core.canonical import canonicalize
from repro.core.queries import QuerySpec

SF = 0.1


@pytest.fixture(scope="module")
def lineitem(spark):
    return synth_data.lineitem(spark, sf=SF).cache()


def test_provenance_extraction_sf01(benchmark, spark, lineitem):
    q = QuerySpec(("l_returnflag", "l_linestatus"), agg="sum", agg_attr="l_quantity")

    def run():
        return q.provenance(lineitem, "l_shipdate <= '1998-09-02'").count()

    benchmark.pedantic(run, rounds=1, iterations=1)


def test_canonicalization_groupby_sf01(benchmark, spark, lineitem):
    q = QuerySpec(("l_returnflag", "l_linestatus"), agg="sum", agg_attr="l_quantity")
    prov = q.provenance(lineitem, "l_shipdate <= '1998-09-02'")

    def run():
        return canonicalize(prov, ["l_returnflag", "l_linestatus"]).count()

    benchmark.pedantic(run, rounds=1, iterations=1)
