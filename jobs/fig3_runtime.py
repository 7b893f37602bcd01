"""Fig. 3 (as a table) — per-edge update runtime vs m for all methods.

The paper's protocol (§V-D): for each method, measure the time to
process one element *and refresh the arriving user's counter*, sweeping
the per-user (virtual) sketch size m. FreeBS/FreeRS are O(1) — flat in
m; CSE, vHLL, LPC, HLL++ enumerate m bits/registers per estimate —
linear in m. All six run in the same sequential Python harness, so the
relative shape (not absolute ns) is the reproduced quantity.

Run: ``python jobs/fig3_runtime.py [--edges N] [--ms 128,256,...]``
"""
import argparse
import sys

import numpy as np
import pandas as pd

from repro.analysis.harness import ALL_METHODS, measure_update_ns
from repro.datasets import CATALOG, generate_stream

DEFAULT_MS = (128, 256, 512, 1024, 2048, 4096)


def fig3(
    n_edges: int = 20_000,
    ms=DEFAULT_MS,
    methods=ALL_METHODS,
    seed: int = 0,
    dataset: str = "sanjose",
) -> pd.DataFrame:
    stream = generate_stream(CATALOG[dataset], seed=seed).head(n_edges)
    users = stream["user"].to_numpy()
    items = stream["item"].to_numpy()
    rows = []
    for m in ms:
        for method in methods:
            ns = measure_update_ns(method, users, items, m=m, seed=seed)
            rows.append({"m": m, "method": method, "ns_per_edge": ns})
    return pd.DataFrame(rows)


def main(argv=None) -> int:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--edges", type=int, default=20_000)
    ap.add_argument("--ms", default=",".join(map(str, DEFAULT_MS)))
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args(argv)
    df = fig3(args.edges, tuple(int(x) for x in args.ms.split(",")), seed=args.seed)
    print("\n=== Fig. 3 as table: ns/edge (update + estimate) ===")
    print(
        df.pivot(index="m", columns="method", values="ns_per_edge")
        .round(0)
        .to_string()
    )
    return 0


if __name__ == "__main__":
    sys.exit(main())
