"""Fig. 5 (as a table) — RSE per cardinality bucket, per method.

The paper's protocol (§V-E): memory preserving the dataset's load
factor, m = 1024 for CSE/vHLL, tracked counters; RSE reported per
power-of-two bucket of the true cardinality (the paper's per-exact-n
curve needs millions of users per n; buckets are the scaled analogue).

Run: ``python jobs/fig5_rse.py [--datasets orkut,sanjose]``
"""
import argparse
import sys

import pandas as pd

from repro.analysis.harness import TABLE2_METHODS, fig5_rse
from repro.datasets import CATALOG, generate_stream

M_VIRTUAL = 1024


def fig5(names: list[str], seed: int = 0) -> pd.DataFrame:
    out = []
    for name in names:
        spec = CATALOG[name]
        stream = generate_stream(spec, seed=seed)
        df = fig5_rse(
            stream, spec.M_bits, m=M_VIRTUAL, methods=TABLE2_METHODS, seed=seed
        )
        df.insert(0, "dataset", name)
        out.append(df)
    return pd.concat(out, ignore_index=True)


def main(argv=None) -> int:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--datasets", default="orkut,sanjose")
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args(argv)
    df = fig5(args.datasets.split(","), seed=args.seed)
    for name, grp in df.groupby("dataset"):
        print(f"\n=== Fig. 5 as table: RSE by cardinality bucket ({name}) ===")
        print(
            grp.pivot(index="bucket_lo", columns="method", values="rse")
            .round(4)
            .to_string()
        )
    return 0


if __name__ == "__main__":
    sys.exit(main())
