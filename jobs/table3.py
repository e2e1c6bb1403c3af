"""spark-submit entrypoint for the Table 3 reproduction harness."""
import sys

from pyspark.sql import SparkSession


def main() -> int:
    spark = SparkSession.builder.appName("table3").getOrCreate()
    from repro.eval.table3 import run_table3
    out = run_table3()
    print(f"table3: {len(out) if not isinstance(out, dict) else len(out['cells'])} rows/cells written to results/")
    spark.stop()
    return 0


if __name__ == "__main__":
    sys.exit(main())
