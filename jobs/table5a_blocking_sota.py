"""Table 5(a): DeepBlocker vs S-GTR-T5 blocking times (+ recall, Fig 3 SotA)."""
from _session import get_spark
from repro.harness import table5a

if __name__ == "__main__":
    spark = get_spark("table5a")
    print(table5a(spark).to_string(index=False))
    spark.stop()
