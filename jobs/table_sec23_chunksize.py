"""spark-submit entrypoint: §2.3 chunk-size table (T-chunk in DESIGN §5).

Usage: spark-submit jobs/table_sec23_chunksize.py
"""
from repro.experiments import sec23
from repro.experiments.common import emit, get_spark


def main() -> None:
    spark = get_spark("table-sec23")
    df = sec23.run(spark)
    emit("table_sec23_chunksize", df,
         "§2.3: version-reconstruction time vs chunk size "
         "(1M records, 100K/version, random chunking).")


if __name__ == "__main__":
    main()
