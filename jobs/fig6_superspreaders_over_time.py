"""Fig. 6 (as a table) — super-spreader FNR/FPR over time t (sanjose).

The paper's protocol (§V-F): Δ = 5e-5, m = 1024, tracked counters;
detection evaluated at checkpoints spread over the stream. The paper
plots sanjose; ``--datasets`` accepts any catalog name.

Run: ``python jobs/fig6_superspreaders_over_time.py``
"""
import argparse
import sys

import pandas as pd

from repro.analysis.harness import TABLE2_METHODS, fig6_over_time
from repro.datasets import CATALOG, generate_stream

DELTA = 5e-5
M_VIRTUAL = 1024


def fig6(
    names: list[str], n_checkpoints: int = 10, seed: int = 0
) -> pd.DataFrame:
    out = []
    for name in names:
        spec = CATALOG[name]
        stream = generate_stream(spec, seed=seed)
        df = fig6_over_time(
            stream, spec.M_bits, delta=DELTA, n_checkpoints=n_checkpoints,
            m=M_VIRTUAL, methods=TABLE2_METHODS, seed=seed,
        )
        df.insert(0, "dataset", name)
        out.append(df)
    return pd.concat(out, ignore_index=True)


def main(argv=None) -> int:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--datasets", default="sanjose")
    ap.add_argument("--checkpoints", type=int, default=10)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args(argv)
    df = fig6(args.datasets.split(","), args.checkpoints, seed=args.seed)
    for name, grp in df.groupby("dataset"):
        for metric in ("fnr", "fpr"):
            print(f"\n=== Fig. 6 as table: {metric.upper()} over time ({name}) ===")
            with pd.option_context("display.float_format", "{:.2e}".format):
                print(
                    grp.pivot(index="t", columns="method", values=metric)
                    .to_string()
                )
    return 0


if __name__ == "__main__":
    sys.exit(main())
