"""Table 3 (right) reproduction: LE-lists, ours (hash-bag frontier) vs
the ParlayLib-style edge-revisit baseline, verified exactly against
Cohen's sequential algorithm."""
import os
from dataclasses import asdict

import pytest

from repro.bench.harness import run_lelists
from repro.graphs.suite import lelists_suite

SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "1.0"))

GRAPHS = [
    "SOC-LJ'-sym",
    "KNN-HH5'-sym",
    "KNN-GL5'-sym",
    "LAT-SQR'-sym",
    "ROAD-GE'",
]
VARIANTS = ["ours", "parlay", "seq"]


@pytest.fixture(scope="module")
def suite():
    return {g.name: g for g in lelists_suite(SCALE)}


@pytest.mark.parametrize("variant", VARIANTS)
@pytest.mark.parametrize("graph", GRAPHS)
def test_table3_lelists(benchmark, spark, suite, graph, variant):
    spec = suite[graph]
    out = {}

    def run():
        out["row"] = run_lelists(spark, spec, variant)

    benchmark.pedantic(run, rounds=1, iterations=1)
    row = out["row"]
    benchmark.extra_info.update(asdict(row))
    assert row.status in ("ok", "t"), f"{graph}/{variant} wrong LE-lists"
