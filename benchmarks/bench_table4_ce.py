"""Paper Table 4: Yannakakis+ under accurate / estimated / worst-case
cardinality estimation, against the native plan."""
import pytest

from _bench_util import run_mode
from repro import tables
from repro.optimizer.cardinality import ACCURATE, ESTIMATED, WORST_CASE
from repro.workloads import all_queries

QS = all_queries()
SCENARIOS = {
    "native": None,
    "accurate": ACCURATE,
    "estimated": ESTIMATED,
    "worst-case": WORST_CASE,
}


@pytest.mark.parametrize("scenario", list(SCENARIOS))
@pytest.mark.parametrize("name", list(tables.TABLE4_QUERIES))
def test_ce_scenario(benchmark, btables, bprepared, name, scenario):
    wl = QS[name]
    benchmark.group = f"table4:{name}"
    if SCENARIOS[scenario] is None:
        args = (wl, btables("job"), "native", bprepared(name))
        kw = {}
    else:
        args = (wl, btables("job"), "yannakakis+", bprepared(name))
        kw = {"ce_mode": SCENARIOS[scenario]}
    benchmark.pedantic(run_mode, args=args, kwargs=kw, rounds=1, iterations=1)
