"""Fig 7/13 shape: Dirty-ER blocking scalability (recall/precision/times).

Sizes default to 10K/50K/100K; pass e.g. --sizes 10000,50000,100000,200000
to extend (2M is CPU-gated on this hardware; see EXPERIMENTS.md).
"""
import sys

from _session import get_spark
from repro.harness import fig7_scalability

if __name__ == "__main__":
    sizes = (10_000, 50_000, 100_000)
    if "--sizes" in sys.argv:
        sizes = tuple(int(x) for x in
                      sys.argv[sys.argv.index("--sizes") + 1].split(","))
    spark = get_spark("fig7")
    df = fig7_scalability(spark, sizes=sizes)
    print(df.to_string(index=False))
    spark.stop()
