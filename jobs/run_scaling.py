"""Fig 14 tables: work-span-model thread scalability + measured Spark
counting-stage scalability over partition counts."""
from _common import emit, get_spark  # noqa: E402

from repro.experiments import (  # noqa: E402
    table_scalability,
    table_spark_counting_scalability,
)


def main() -> None:
    spark = get_spark("repro-scaling")
    try:
        emit(table_scalability(), "t6a_scalability_sim")
        emit(table_spark_counting_scalability(spark), "t6b_spark_counting_scaling")
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
