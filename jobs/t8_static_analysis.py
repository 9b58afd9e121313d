"""T8 (§3.2): static-analysis latency (<10 ms claim)."""
from _session import get_spark  # noqa: F401
from repro.experiments import t8_static_analysis as t8
from repro.experiments.common import fmt_table

if __name__ == "__main__":
    print("## T8 — static-analysis latency per script")
    print(fmt_table(t8.run(reps=50)))
