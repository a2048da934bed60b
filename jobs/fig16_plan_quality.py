"""Figure 16 reproduction: executor latency and memory when guided by a
greedily chosen (GWMIN) plan versus an optimal (Sharon) plan, varying
workload size over star-shaped workloads where GWMIN is provably
sub-optimal.

Run: ``python jobs/fig16_plan_quality.py``.
"""
from _common import emit


def main() -> None:
    from repro.experiments import fig16_experiment

    emit("Fig 16: greedy vs optimal plan quality", fig16_experiment())


if __name__ == "__main__":
    main()
