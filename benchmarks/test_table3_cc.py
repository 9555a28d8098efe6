"""Table 3 (left) reproduction: LDD-UF-JTB connectivity, ours vs the
ConnectIt "DHS'21" baseline (plus the sequential union-find reference),
on symmetrized Table-2 analogues + two road networks."""
import os
from dataclasses import asdict

import pytest

from repro.bench.harness import run_cc
from repro.graphs.suite import table3_suite

SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "1.0"))

GRAPHS = [
    "SOC-LJ'-sym",
    "WEB-SD'-sym",
    "KNN-HH5'-sym",
    "KNN-GL5'-sym",
    "LAT-SQR'-sym",
    "LAT-SQRp'-sym",
    "ROAD-GE'",
    "ROAD-USA'",
]
VARIANTS = ["ours", "dhs21", "seq"]


@pytest.fixture(scope="module")
def suite():
    return {g.name: g for g in table3_suite(SCALE)}


@pytest.mark.parametrize("variant", VARIANTS)
@pytest.mark.parametrize("graph", GRAPHS)
def test_table3_cc(benchmark, spark, suite, graph, variant):
    spec = suite[graph]
    out = {}

    def run():
        out["row"] = run_cc(spark, spec, variant)

    benchmark.pedantic(run, rounds=1, iterations=1)
    row = out["row"]
    benchmark.extra_info.update(asdict(row))
    assert row.status in ("ok", "t"), f"{graph}/{variant} wrong #components"
