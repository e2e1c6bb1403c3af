"""spark-submit entrypoint for the Table 4 reproduction harness."""
import sys

from pyspark.sql import SparkSession


def main() -> int:
    spark = SparkSession.builder.appName("table4").getOrCreate()
    from repro.eval.table4 import run_table4
    out = run_table4()
    print(f"table4: {len(out) if not isinstance(out, dict) else len(out['cells'])} rows/cells written to results/")
    spark.stop()
    return 0


if __name__ == "__main__":
    sys.exit(main())
