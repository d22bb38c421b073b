"""Figure 17: Parquet bitmap selection across selectivities."""
from _session import get_spark

from repro.experiments.parquet_bench import print_fig17, run_fig17

if __name__ == "__main__":
    spark = get_spark("fig17")
    for ds in ("normal", "poisson", "books", "ml"):
        print(print_fig17(run_fig17(spark, dataset=ds), title=f"Fig 17 [{ds}]"))
    spark.stop()
