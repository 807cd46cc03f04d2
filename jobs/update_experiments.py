"""Regenerate the 'Measured' Table-3 block in EXPERIMENTS.md from
results/table3.json (run after `pytest benchmarks/ --benchmark-only`)."""
import json
import os
import re

ROOT = os.path.dirname(os.path.dirname(os.path.abspath(__file__)))


def table3_block() -> str:
    rows = json.load(open(os.path.join(ROOT, "results", "table3.json")))
    order = {"C_sl": 0, "C_ex_sh_sl": 1, "C_aut": 2}
    rows.sort(key=lambda r: (order[r["collection"]], r["algo"]))
    out = [
        "| coll. | algo | diff | scratch | adaptive | adaptive/best | adaptive modes |",
        "|---|---|---|---|---|---|---|",
    ]
    for r in rows:
        out.append(
            f"| {r['collection']} | {r['algo']} | {r['diff_s']} | "
            f"{r['scratch_s']} | {r['adaptive_s']} | {r['adaptive_vs_best']} | "
            f"`{r['adaptive_modes']}` |"
        )
    return "\n".join(out)


def main() -> None:
    path = os.path.join(ROOT, "EXPERIMENTS.md")
    text = open(path).read()
    block = (
        "<!-- table3-measured:begin -->\n" + table3_block() + "\n<!-- table3-measured:end -->"
    )
    new = re.sub(
        r"<!-- table3-measured:begin -->.*?<!-- table3-measured:end -->",
        lambda _: block,
        text,
        flags=re.S,
    )
    open(path, "w").write(new)
    print("EXPERIMENTS.md table 3 updated")


if __name__ == "__main__":
    main()
