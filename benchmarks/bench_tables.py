"""One pytest-benchmark target per evaluation table.

Each benchmark regenerates its table at a reduced scale inside the timed
region (single round — these are end-to-end harness runs, not
microbenchmarks) and asserts the paper-vs-measured structure, so
``pytest benchmarks/ --benchmark-only`` both times and re-derives every
table. ``jobs/run_all.py --scale default`` produces the full-scale
numbers recorded in EXPERIMENTS.md.
"""
import pytest

from repro.eval.tables import (
    EvalRun,
    Scale,
    table3,
    table5,
    table6,
    table7,
    table8,
    table9,
    table10,
)

_SCALE = Scale(wikipedia=12, excel=6, synthetic=10, formulas=24, row_scale=0.1)


@pytest.fixture(scope="module")
def run(spark):
    return EvalRun(spark, scale=_SCALE).build()


def _once(benchmark, fn, *args, **kwargs):
    return benchmark.pedantic(
        fn, args=args, kwargs=kwargs, rounds=1, iterations=1
    )


def test_bench_table3(benchmark, run):
    t = _once(benchmark, table3, run)
    assert len(t) == 4


def test_bench_table5_detection(benchmark, run):
    t = _once(benchmark, table5, run)
    assert len(t) == 8


def test_bench_table6_repair(benchmark, run):
    t = _once(benchmark, table6, run)
    assert len(t) == 8


def test_bench_table7_repair_given_detect(benchmark, run):
    t = _once(benchmark, table7, run)
    assert len(t) == 8


def test_bench_table8_execution_guided(benchmark, run):
    t = _once(benchmark, table8, run)
    assert list(t["system"])[0] == "No Repair"


def test_bench_table9_ablations(benchmark, run):
    t = _once(benchmark, table9, run)
    assert len(t) == 5


def test_bench_table10_runtime(benchmark, run):
    t = _once(benchmark, table10, run, n_tables=6)
    assert len(t) == 8
