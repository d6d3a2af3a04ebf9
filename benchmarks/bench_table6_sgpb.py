"""Paper Table 6: the SGPB classification itself (a pure-planner
computation), benchmarked and asserted against the paper's rows."""
import pytest

from repro import tables


def test_classification(benchmark):
    benchmark.group = "table6:classification"
    rows = benchmark.pedantic(tables.table6, rounds=3, iterations=1)
    got = {r["query"].removeprefix("sgpb-"): r for r in rows}
    for q, (shape, qtype, preds, fc) in tables.PAPER_TABLE6.items():
        assert got[q]["shape"] == shape
        assert got[q]["predicates"] == preds
        assert got[q]["free_connex"] == fc
