"""Micro-benchmarks of DataVinci's core stages at SF≈0.1-equivalent
column sizes (hundreds of rows per column, as in the Excel benchmark)."""
import numpy as np
import pandas as pd
import pytest

from repro.benchgen.domains import DOMAINS
from repro.core.datavinci import DataVinciConfig, clean_table
from repro.core.editdp import minimal_program
from repro.core.nfa import build_dag
from repro.core.profiler import learn_patterns
from repro.core.semantics import abstract_column


@pytest.fixture(scope="module")
def code_column():
    rng = np.random.default_rng(0)
    return list(DOMAINS["code"].generate(rng, 500)["Code"])


def test_bench_profiler(benchmark, code_column):
    out = benchmark(learn_patterns, code_column)
    assert out


def test_bench_semantic_abstraction(benchmark, code_column):
    model = benchmark(abstract_column, code_column)
    assert model.active_types


def test_bench_edit_dp(benchmark, code_column):
    (lp,) = learn_patterns(code_column[:50])
    dag = build_dag(lp.pattern, 7)

    def run():
        return minimal_program(dag, "usa_837")

    assert benchmark(run) is not None


def test_bench_clean_table(benchmark):
    rng = np.random.default_rng(1)
    df = DOMAINS["player_id"].generate(rng, 200).astype(str)
    df.iloc[5, 1] = "usa_837"

    def run():
        return clean_table(df, DataVinciConfig())

    reps = benchmark(run)
    assert any(r.repaired == "US-837-PRO" or r.repaired for r in reps)
