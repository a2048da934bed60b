"""Figure 15 reproduction: optimizer comparison — Sharon optimizer (SO)
vs greedy GWMIN optimizer (GO) vs exhaustive optimizer (EO) — latency
and peak memory per phase while varying the number of queries
(running-example clusters, 7 queries each).

Run: ``python jobs/fig15_optimizer.py``.
"""
from _common import emit


def main() -> None:
    from repro.experiments import fig15_experiment

    emit("Fig 15: optimizer latency/memory (GO vs SO vs EO)", fig15_experiment())


if __name__ == "__main__":
    main()
