"""Figure 13 reproduction: two-step (Flink-like, SPASS-like) versus
online (A-Seq, Sharon) event sequence aggregation over the Linear-Road
analogue stream, varying events per window.

Run: ``spark-submit jobs/fig13_twostep_vs_online.py`` (or plain python).
"""
from _common import emit, get_spark


def main() -> None:
    spark = get_spark("fig13")
    from repro.experiments import fig13_experiment

    rows = fig13_experiment(spark)
    emit("Fig 13: two-step vs online (latency ms/window, throughput ev/s)", rows)
    spark.stop()


if __name__ == "__main__":
    main()
