"""Fig 8 shape: unsupervised matching best-F1 per model/dataset."""
from _session import get_spark
from repro.harness import evaluate_all, fig8_unsup

if __name__ == "__main__":
    spark = get_spark("fig8")
    results = evaluate_all(spark)
    df = fig8_unsup(results)
    print(df.pivot_table(index="dataset", columns="model",
                         values="f1").to_string())
    spark.stop()
