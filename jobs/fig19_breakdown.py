"""Figure 19: time breakdown of block compression on bitmap selection."""
from _session import get_spark

from repro.experiments.parquet_bench import print_fig19, run_fig19

if __name__ == "__main__":
    spark = get_spark("fig19")
    print(print_fig19(run_fig19(spark)))
    spark.stop()
