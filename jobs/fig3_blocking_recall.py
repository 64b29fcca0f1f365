"""Fig 3/4 shape: blocking recall per model/dataset for k in {1,5,10}."""
from _session import get_spark
from repro.harness import evaluate_all, fig3_blocking_recall

if __name__ == "__main__":
    spark = get_spark("fig3")
    results = evaluate_all(spark)
    df = fig3_blocking_recall(results)
    print(df.pivot_table(index=["dataset", "k"], columns="model",
                         values="recall").to_string())
    spark.stop()
