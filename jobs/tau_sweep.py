"""Tau-sweep study (the data behind the paper's Fig. 11 / Sec. 6.3):
relative cost of the full SCC run as a function of the local-search
budget tau, per graph.

The cost proxy is the modeled 96-core time from measured counters (work
/ cores + rounds x barrier) — tau trades rounds against wasted local
work exactly as in the paper, and the proxy exposes the same U-shape.
Runs driver-side (round counts are path-invariant).
"""
import argparse
import sys

from repro.bench.harness import spec_csr
from repro.core.counters import simulated_time
from repro.core.scc import bgss_scc
from repro.graphs.suite import table2_suite

TAUS = [1, 2, 8, 32, 128, 512, 2048, 8192]


def main(argv=None) -> int:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--graphs", default="SOC-LJ',WEB-SD',KNN-GL5',LAT-SQR'")
    args = ap.parse_args(argv)
    picks = set(args.graphs.split(","))
    hdr = f"{'graph':12s}" + "".join(f" tau={t:<6d}" for t in TAUS)
    print(hdr + "   (modeled 96-core seconds; tau=1 == plain BFS)")
    for spec in table2_suite(args.scale):
        if spec.name not in picks:
            continue
        c = spec_csr(spec)
        cells = []
        for tau in TAUS:
            r = bgss_scc(None, csr=c, variant="final", tau=tau, seed=42)
            cells.append(simulated_time(r.counters))
        print(f"{spec.name:12s}" + "".join(f" {x:10.4f}" for x in cells))
    return 0


if __name__ == "__main__":
    sys.exit(main())
