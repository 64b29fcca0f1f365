"""Table 5(b): ZeroER vs end-to-end S-GTR-T5 (times + F1, Fig 8d)."""
from _session import get_spark
from repro.harness import table5b

if __name__ == "__main__":
    spark = get_spark("table5b")
    print(table5b(spark).to_string(index=False))
    spark.stop()
