"""Figure 18: file sizes with zlib (zstd stand-in) block compression."""
from repro.experiments.parquet_bench import print_fig18, run_fig18

if __name__ == "__main__":
    print(print_fig18(run_fig18()))
