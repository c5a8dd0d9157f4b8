"""T3 entrypoint — master-dependent vs independent concurrent execution.

    spark-submit jobs/run_scheduler_bench.py [n_queries] [rate]
"""
import sys

from _session import build

from repro.experiments import table3


def main() -> None:
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 8
    rate = float(sys.argv[2]) if len(sys.argv) > 2 else 10.0
    spark = build("saql-scheduler-bench")
    try:
        table = table3.run(spark, n_queries=n, events_per_host_per_min=rate)
        print("\n=== T3: concurrent query scheduling ===")
        print(table3.format_table(table))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
