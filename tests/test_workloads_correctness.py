"""The central correctness battery: every workload query of every benchmark,
executed in all three modes (native / Yannakakis / Yannakakis+), checked
row-for-row against DuckDB running the canonical SQL of the query.

This is what licenses the benchmark numbers: a faster plan that returns
different rows would fail here, not silently "win"."""
import pytest

from repro import harness
from repro.oracle import assert_equivalent
from repro.workloads import all_queries

QUERIES = all_queries()


def _check(quiet_spark, bench_tables, pandas_sources, prepared_cache, name, mode):
    wl = QUERIES[name]
    tables = bench_tables(wl.benchmark)
    prep = prepared_cache(name)
    df, _ = harness.build(wl, tables, mode, prepared=prep)
    pdf = {
        src: pandas_sources(wl.benchmark, src)
        for src in {r.source for r in wl.cq.relations}
    }
    assert_equivalent(df, wl.cq.to_sql(), **pdf)


@pytest.mark.parametrize("mode", harness.MODES)
@pytest.mark.parametrize("name", sorted(QUERIES))
def test_query_mode_matches_oracle(
    quiet_spark, bench_tables, pandas_sources, prepared_cache, name, mode
):
    _check(quiet_spark, bench_tables, pandas_sources, prepared_cache, name, mode)
