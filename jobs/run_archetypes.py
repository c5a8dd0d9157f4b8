"""T2 entrypoint — the paper's Queries 1-4 over the demo stream.

    spark-submit jobs/run_archetypes.py [events_per_host_per_min]
"""
import sys

from _session import build

from repro.experiments import table2


def main() -> None:
    rate = float(sys.argv[1]) if len(sys.argv) > 1 else 10.0
    spark = build("saql-archetypes")
    try:
        table = table2.run(spark, events_per_host_per_min=rate)
        print("\n=== T2: published query archetypes ===")
        print(table2.format_table(table))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
