"""T1 entrypoint — the demo's command-line UI, batch-replay edition.

Replays the synthetic enterprise stream (with the 5-step APT attack)
through the streaming executor running all 8 demo SAQL queries,
printing alerts as they fire and the final detection table.

    spark-submit jobs/run_attack_detection.py [events_per_host_per_min]
"""
import sys

from _session import build

from repro.experiments import table1


def main() -> None:
    rate = float(sys.argv[1]) if len(sys.argv) > 1 else 10.0
    spark = build("saql-attack-detection")
    try:
        table = table1.run(spark, events_per_host_per_min=rate, verbose=True)
        print("\n=== T1: APT attack step detection ===")
        print(table1.format_table(table))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
