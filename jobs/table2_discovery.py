"""Table 2 entrypoint: discovery preprocessing + query timing, 3 systems."""
from _session import get_spark

from repro.baselines import santos_like, starmie_like
from repro.discovery import metrics
from repro.discovery import union_search as us
from repro.lakegen.benchmarks import CONFIGS, build_benchmark


def main() -> None:
    spark = get_spark("table2")
    for name in CONFIGS:
        lake = build_benchmark(name)
        truths = {q: lake.unionable_with(q) for q in lake.query_tables}
        print(f"\n=== {name} ===")
        for label, build, evaluate in (
            ("KGLiDS", lambda: us.build_index(spark, lake), us.evaluate),
            ("Starmie", lambda: starmie_like.build_index(lake), starmie_like.evaluate),
            ("SANTOS", lambda: santos_like.build_index(lake), santos_like.evaluate),
        ):
            idx = build()
            res, q_s = evaluate(idx, lake)
            p, r = metrics.average_pr_at_k(res, truths, lake.k)
            print(f"  {label:>8}: preprocessing={idx.preprocessing_s:8.2f}s "
                  f"avg_query={q_s*1000:9.3f}ms P@k={p:.3f} R@k={r:.3f}")
    spark.stop()


if __name__ == "__main__":
    main()
