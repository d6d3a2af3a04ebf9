"""Benchmark fixtures: benchmark-scale tables (≈100 MB total across the
four workloads) shared by all bench files. One bench file per paper table;
`pytest benchmarks/ --benchmark-only` regenerates the numbers behind
EXPERIMENTS.md."""
import os
import sys

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "32")
sys.path.insert(0, os.path.dirname(__file__))  # for _bench_util

import pytest


@pytest.fixture(scope="session")
def bspark(spark):
    spark.sparkContext.setLogLevel("ERROR")
    return spark


@pytest.fixture(scope="session")
def btables(bspark):
    from repro import harness, tables

    def get(benchmark):
        return harness.tables_for(bspark, benchmark, **tables.BENCH_SCALE[benchmark])

    return get


@pytest.fixture(scope="session")
def bprepared(btables):
    from repro import harness
    from repro.workloads import all_queries

    qs = all_queries()
    cache = {}

    def get(name):
        if name not in cache:
            wl = qs[name]
            cache[name] = harness.prepare(wl, btables(wl.benchmark))
        return cache[name]

    return get
