"""Table 1 entrypoint: profile the four benchmark lakes.

Usage: spark-submit jobs/table1_profile.py  (or python jobs/table1_profile.py)
"""
from _session import get_spark

from repro.core import profiler
from repro.lakegen.benchmarks import CONFIGS, PAPER_TABLE1, build_benchmark


def main() -> None:
    spark = get_spark("table1")
    for name in CONFIGS:
        lake = build_benchmark(name)
        profiles = profiler.profile_tables(spark, lake.tables, name)
        breakdown = profiler.type_breakdown(profiles)
        paper = PAPER_TABLE1[name]
        print(f"\n=== {name}: {len(lake.tables)} tables "
              f"(paper {paper['n_tables']}), {lake.n_columns()} columns "
              f"(paper {paper['total_cols']}) ===")
        for row in breakdown.itertuples(index=False):
            print(f"  {row.fgt:>18}: {row.count:>6} (paper {paper[row.fgt]})")
    spark.stop()


if __name__ == "__main__":
    main()
