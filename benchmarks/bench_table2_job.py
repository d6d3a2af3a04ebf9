"""Paper Table 2: JOB-pool running times per mode (native / Yannakakis /
Yannakakis+). The statistics rows of the table are the per-mode
Max/Mean/Median/StdDev over these benchmarks (jobs/table2_job_stats.py
prints them directly)."""
import pytest

from _bench_util import run_mode
from repro import harness
from repro.workloads import all_queries

QS = all_queries()
JOB = sorted(n for n in QS if n.startswith("job-"))


@pytest.mark.parametrize("mode", harness.MODES)
@pytest.mark.parametrize("name", JOB)
def test_job_query(benchmark, btables, bprepared, name, mode):
    wl = QS[name]
    benchmark.group = f"table2:{name}"
    benchmark.pedantic(
        run_mode,
        args=(wl, btables("job"), mode, bprepared(name)),
        rounds=1, iterations=1,
    )
