"""spark-submit entrypoint for the Table 6 reproduction harness."""
import sys

from pyspark.sql import SparkSession


def main() -> int:
    spark = SparkSession.builder.appName("table6").getOrCreate()
    from repro.eval.table6 import run_table6
    out = run_table6(spark=spark)
    print(f"table6: {len(out) if not isinstance(out, dict) else len(out['cells'])} rows/cells written to results/")
    spark.stop()
    return 0


if __name__ == "__main__":
    sys.exit(main())
