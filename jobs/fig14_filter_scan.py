"""Figure 14: Parquet filter-scan with Default / FOR / LeCo encodings."""
from _session import get_spark

from repro.experiments.parquet_bench import fig14_table, print_fig14, run_fig14, write_fig14_files

if __name__ == "__main__":
    spark = get_spark("fig14")
    paths = write_fig14_files(fig14_table(2_000_000))
    print(print_fig14(run_fig14(spark, paths)))
    spark.stop()
