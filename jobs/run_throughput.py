"""T4 entrypoint — engine throughput/latency vs stream rate.

    spark-submit jobs/run_throughput.py
"""
from _session import build

from repro.experiments import table4


def main() -> None:
    spark = build("saql-throughput")
    try:
        table = table4.run(spark)
        print("\n=== T4a: batch-engine throughput ===")
        print(table4.format_table(table))
        lat = table4.run_streaming_latency(spark)
        print("\n=== T4b: streaming per-batch latency ===")
        print(table4.format_table(lat))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
