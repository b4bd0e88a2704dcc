"""Session-scoped sweep fixtures shared by the per-table benchmarks.

Each of the paper's table groups (1-3 SIFT, 4-6 GIST, 7 Groups, 8-9
real-world) is produced by ONE sweep; the per-table bench files render
their table from the shared result and time a representative operation.

``REPRO_BENCH_SCALE`` (default 1.0) scales dataset sizes, e.g. 0.2 for a
quick smoke run of the full bench suite.
"""
import os

import pytest

from repro.eval.experiments import (
    run_gist,
    run_groups_spill,
    run_realworld,
    run_sift,
)

SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "1.0"))


@pytest.fixture(scope="session")
def bench_scale():
    return SCALE


@pytest.fixture(scope="session")
def sift_sweep(spark, tmp_path_factory):
    work = str(tmp_path_factory.mktemp("bench-sift"))
    res = run_sift(spark, work, scale=SCALE)
    return res, work


@pytest.fixture(scope="session")
def gist_sweep(spark, tmp_path_factory):
    work = str(tmp_path_factory.mktemp("bench-gist"))
    res = run_gist(spark, work, scale=SCALE)
    return res, work


@pytest.fixture(scope="session")
def groups_spill_rows(spark, tmp_path_factory):
    work = str(tmp_path_factory.mktemp("bench-groups"))
    rows = run_groups_spill(spark, work, scale=SCALE)
    return rows, work


@pytest.fixture(scope="session")
def realworld_rows(spark, tmp_path_factory):
    work = str(tmp_path_factory.mktemp("bench-realworld"))
    rows = run_realworld(spark, work, scale=SCALE)
    return rows, work
