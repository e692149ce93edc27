"""Paper Table 8: filtering vs verification time on Glove [sec]."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import make_parser, emit, get_spark, apply_n_override
from repro.harness import tables as T

if __name__ == "__main__":
    args = make_parser(__doc__).parse_args()
    apply_n_override(args.n)
    spark = get_spark("decomposed_detection")
    emit(T.render(T.table8(spark),
                  "Table 8: Decomposed detection on Glove [sec]"),
         args.out)
    spark.stop()
