"""Adaptive Structured Streaming demo: the Jarvis runtime refining load
factors live over micro-batch epochs (one per 10-s window of the trace).
"""
import tempfile

from repro.experiments.report import md_table
from repro.session import get_session
from repro.streaming.pushdown import run_adaptive_stream, write_epoch_files
from repro.workloads.queries import s2s_query


def main() -> None:
    spark = get_session("adaptive-stream")
    spark.sparkContext.setLogLevel("ERROR")
    bundle = s2s_query(spark, n_sources=4, peers_per_source=40, n_windows=8)
    with tempfile.TemporaryDirectory() as tmp:
        write_epoch_files(bundle.input_df, f"{tmp}/epochs")
        history = run_adaptive_stream(
            spark,
            f"{tmp}/epochs",
            bundle.pipeline,
            budget_core=0.6,
            checkpoint_dir=f"{tmp}/ckpt",
            detect_epochs=1,
        )
    print(md_table([h.__dict__ for h in history]))
    spark.stop()


if __name__ == "__main__":
    main()
