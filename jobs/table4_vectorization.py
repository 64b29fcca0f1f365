"""Table 4: vectorization time (init + transform) per model and dataset."""
from _session import get_spark
from repro.harness import evaluate_all, table4

if __name__ == "__main__":
    spark = get_spark("table4")
    results = evaluate_all(spark)
    print(table4(results).to_string())
    spark.stop()
