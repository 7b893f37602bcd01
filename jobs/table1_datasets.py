"""Table I — dataset summary (paper vs scaled synthetic stand-ins).

Generates every catalog dataset, computes #users / max-cardinality /
total-cardinality with Spark (cross-checked against the DuckDB oracle),
and prints them next to the paper's numbers and the scaled targets.

Run: ``spark-submit jobs/table1_datasets.py [--datasets a,b] [--seed N]``
"""
import argparse
import sys

import pyspark.sql.functions as F
from pyspark.sql import SparkSession

from repro.datasets import CATALOG, generate_stream
from repro.oracle import assert_equivalent


def table1(spark: SparkSession, names: list[str], seed: int):
    rows = []
    for name in names:
        spec = CATALOG[name]
        stream = generate_stream(spec, seed=seed)
        sdf = spark.createDataFrame(stream)
        per_user = sdf.groupBy("user").agg(
            F.countDistinct("item").alias("card")
        )
        assert_equivalent(
            per_user,
            "SELECT user, COUNT(DISTINCT item) AS card FROM edges GROUP BY user",
            edges=stream,
        )
        agg = per_user.agg(
            F.count("*").alias("users"),
            F.max("card").alias("max_card"),
            F.sum("card").alias("total_card"),
        ).collect()[0]
        rows.append(
            {
                "dataset": name,
                "scale": spec.scale,
                "paper_users": spec.paper_users,
                "users": int(agg["users"]),
                "paper_max_card": spec.paper_max_card,
                "max_card": int(agg["max_card"]),
                "paper_total_card": spec.paper_total_card,
                "total_card": int(agg["total_card"]),
                "stream_len": len(stream),
                "M_bits": spec.M_bits,
            }
        )
    return rows


def main(argv=None) -> int:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--datasets", default=",".join(CATALOG))
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args(argv)
    spark = SparkSession.builder.appName("table1").getOrCreate()
    rows = table1(spark, args.datasets.split(","), args.seed)
    import pandas as pd

    print("\n=== Table I (paper vs synthetic stand-in, oracle-verified) ===")
    print(pd.DataFrame(rows).to_string(index=False))
    return 0


if __name__ == "__main__":
    sys.exit(main())
