"""spark-submit entrypoint reproducing Table 7 (see repro.eval.experiments.table7_multi_questions)."""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import emit, get_spark, parse_args

from repro.eval.experiments import build_all_artifacts, table7_multi_questions


def main() -> None:
    args = parse_args(__doc__)
    spark = get_spark("table7")
    artifacts = build_all_artifacts(spark, scale=args.scale, seed=args.seed)
    emit(table7_multi_questions(artifacts), "Table 7")


if __name__ == "__main__":
    main()
