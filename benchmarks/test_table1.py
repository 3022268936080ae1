"""Benchmark: Table 1 — J1/J2/J3 EQL queries on yago_lite."""
import pytest

from repro.core.filters import CTPFilters
from repro.eql import EQLEngine
from repro.experiments.table1_yago import J1, J2, J3
from repro.graph.random_graphs import yago_lite
from repro.lang import parse

_DEFAULTS = CTPFilters(timeout_s=60.0)


@pytest.fixture(scope="module")
def engine(spark):
    return EQLEngine(spark, yago_lite(scale=0.1, seed=11))


def test_table1_j1(benchmark, engine):
    n = benchmark.pedantic(
        lambda: engine.evaluate(
            parse(J1), algo="MoLESP", default_filters=_DEFAULTS
        ).result.count(),
        iterations=1, rounds=2,
    )
    assert n >= 0


def test_table1_j2_multi_queue(benchmark, engine):
    n = benchmark.pedantic(
        lambda: engine.evaluate(
            parse(J2), algo="MoLESP", default_filters=_DEFAULTS,
            multi_queue=True,
        ).result.count(),
        iterations=1, rounds=2,
    )
    assert n >= 0


def test_table1_j3_n_seed_set(benchmark, engine):
    n = benchmark.pedantic(
        lambda: engine.evaluate(
            parse(J3), algo="MoLESP", default_filters=_DEFAULTS
        ).result.count(),
        iterations=1, rounds=2,
    )
    assert n > 0
