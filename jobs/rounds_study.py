"""Fig.-10-shaped evidence for Table 2's mechanism: per-search round
counts with VGC (tau=2^9) vs without (tau=1), per graph.

Round counts are path-invariant (identical on driver and Spark paths),
so this study runs driver-side and is cheap.  The paper reports that
local search reduces rounds by 3-200x; this prints the same per-search
(x, y) data points and the per-graph average ratio.
"""
import argparse
import sys

import numpy as np

from repro.bench.harness import spec_csr
from repro.core.scc import bgss_scc
from repro.graphs.suite import table2_suite


def main(argv=None) -> int:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    args = ap.parse_args(argv)
    print(f"{'graph':12s} {'searches':>8s} {'rounds(tau=1)':>14s} "
          f"{'rounds(VGC)':>12s} {'avg y/x':>8s} {'max y/x':>8s}")
    for spec in table2_suite(args.scale):
        c = spec_csr(spec)
        plain = bgss_scc(None, csr=c, variant="plain", seed=42)
        final = bgss_scc(None, csr=c, variant="final", seed=42)
        # Same seed => same batches => searches align 1:1.
        ys = np.asarray(plain.counters.search_rounds, dtype=float)
        xs = np.asarray(final.counters.search_rounds, dtype=float)
        k = min(len(xs), len(ys))
        xs, ys = np.maximum(xs[:k], 1), np.maximum(ys[:k], 1)
        ratio = ys / xs
        print(
            f"{spec.name:12s} {k:8d} {int(ys.sum()):14d} {int(xs.sum()):12d} "
            f"{ratio.mean():8.1f} {ratio.max():8.1f}"
        )
    return 0


if __name__ == "__main__":
    sys.exit(main())
