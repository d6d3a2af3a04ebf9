"""Paper Table 3: rule-based optimization ablation on JOB-1a / JOB-4a
(Base = native plan, Primitive = no rules, PK-FK only, Annot only, both)."""
import pytest

from _bench_util import run_mode
from repro import tables
from repro.workloads import all_queries

QS = all_queries()


@pytest.mark.parametrize("variant", list(tables.TABLE3_VARIANTS))
@pytest.mark.parametrize("name", ["job-1a", "job-4a"])
def test_rule_variant(benchmark, btables, bprepared, name, variant):
    wl = QS[name]
    rules = tables.TABLE3_VARIANTS[variant]
    benchmark.group = f"table3:{name}"
    if rules is None:
        args = (wl, btables("job"), "native", bprepared(name))
        kw = {}
    else:
        args = (wl, btables("job"), "yannakakis+", bprepared(name))
        kw = {"rules": rules}
    benchmark.pedantic(run_mode, args=args, kwargs=kw, rounds=1, iterations=1)
