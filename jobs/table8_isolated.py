"""spark-submit entrypoint reproducing Table 8 (see repro.eval.experiments.table8_isolated)."""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import emit, get_spark, parse_args

from repro.eval.experiments import build_all_artifacts, table8_isolated


def main() -> None:
    args = parse_args(__doc__)
    spark = get_spark("table8")
    artifacts = build_all_artifacts(spark, scale=args.scale, seed=args.seed)
    emit(table8_isolated(artifacts), "Table 8")


if __name__ == "__main__":
    main()
