"""§7.2.1 headline (Figure 9 as numbers): native vs Yannakakis+ across the
SGPB, LSQB and TPC-H workloads (the JOB pool is covered by
bench_table2_job.py, which also runs the classic Yannakakis baseline)."""
import pytest

from _bench_util import run_mode
from repro.workloads import all_queries

QS = all_queries()
POOL = sorted(
    n for n in QS
    if n.split("-")[0] in ("sgpb", "lsqb", "tpch")
)


@pytest.mark.parametrize("mode", ["native", "yannakakis+"])
@pytest.mark.parametrize("name", POOL)
def test_speedup_query(benchmark, btables, bprepared, name, mode):
    wl = QS[name]
    benchmark.group = f"speedup:{name}"
    benchmark.pedantic(
        run_mode,
        args=(wl, btables(wl.benchmark), mode, bprepared(name)),
        rounds=1, iterations=1,
    )
