"""spark-submit entrypoint reproducing Table 4 (see repro.eval.experiments.table4_attribute_matching)."""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import emit, get_spark, parse_args

from repro.eval.experiments import build_all_artifacts, table4_attribute_matching


def main() -> None:
    args = parse_args(__doc__)
    spark = get_spark("table4")
    artifacts = build_all_artifacts(spark, scale=args.scale, seed=args.seed)
    emit(table4_attribute_matching(artifacts), "Table 4")


if __name__ == "__main__":
    main()
