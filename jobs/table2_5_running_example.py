"""Reproduce Tables 2–5: buffer evolution of the running example
(Figure 3) under every selection policy.

Usage: spark-submit jobs/table2_5_running_example.py
"""
from repro.core.api import make_engine
from repro.core.distributed import provenance_to_spark
from repro.session import build_spark
from repro.tin.datasets import running_example


def main() -> None:
    spark = build_spark("table2-5")
    pdf = running_example()
    engines = {
        "Table 2 (NoProv |B_v|)": make_engine("noprov"),
        "Table 3 (oldest-first triples)": make_engine("lrb"),
        "Table 4 (LIFO pairs)": make_engine("lifo"),
        "Table 5 (proportional vectors)": make_engine(
            "prop_dense", vertices=[0, 1, 2]
        ),
    }
    for title, eng in engines.items():
        print(f"\n=== {title} ===")
        print(f"{'r':>14} | buffers after the interaction")
        for s, d, t, q in pdf.itertuples(index=False):
            eng.process(int(s), int(d), float(t), float(q))
            state = []
            for v in (0, 1, 2):
                if eng.policy == "noprov":
                    state.append(f"|B_v{v}|={eng.buffer_total(v):g}")
                elif eng.policy == "lrb":
                    state.append(f"B_v{v}={eng.buffer_triples(v)}")
                elif eng.policy == "lifo":
                    state.append(f"B_v{v}={eng.buffer_pairs(v)}")
                else:
                    state.append(f"p_v{v}={[round(x, 2) for x in eng.vector(v)]}")
            print(f"<v{int(s)},v{int(d)},{t:g},{q:g}> | " + "  ".join(state))
        print("\nfinal provenance as a Spark DataFrame:")
        if eng.policy != "noprov":
            provenance_to_spark(eng, spark).orderBy("vertex", "origin").show()
    spark.stop()


if __name__ == "__main__":
    main()
