"""Table 1 — LogHub / LogHub-2.0 dataset statistics.

Prints, per dataset: our lite corpus's #logs / size / #templates next
to the paper's numbers. Our corpora are synthetic stand-ins (DESIGN.md
§3.1); template counts match the paper by construction, log counts are
2,000 (LogHub) and sqrt-scaled (LogHub-2.0-lite).
"""
from __future__ import annotations

import sys

from repro.logs import LOGHUB, LOGHUB2, corpus_stats, loghub2_lite, loghub_lite

# Paper Table 1 sizes (KB / MB / GB normalized to bytes) for reference.
_PAPER_LOGHUB_SIZE = {
    "HealthApp": "183.06 KB", "OpenStack": "581.17 KB", "OpenSSH": "219.94 KB",
    "Proxifier": "231.41 KB", "HPC": "147.63 KB", "Zookeeper": "273.33 KB",
    "Mac": "311.93 KB", "Hadoop": "375.93 KB", "Linux": "211.41 KB",
    "Android": "272.54 KB", "HDFS": "281.10 KB", "BGL": "309.72 KB",
    "Windows": "278.74 KB", "Apache": "167.23 KB", "Thunderbird": "317.57 KB",
    "Spark": "191.67 KB",
}


def run(spark=None, scale: float = 1.0) -> list[dict]:
    """Compute Table-1 rows (spark unused: generation is driver-side)."""
    rows = []
    for name, n_templates in LOGHUB.items():
        pdf, bank = loghub_lite(name)
        st = corpus_stats(pdf)
        row = {
            "dataset": name,
            "lh_logs": st["n_logs"], "lh_kb": round(st["size_bytes"] / 1024, 1),
            "lh_templates": st["n_templates"], "lh_bank": bank.n_templates,
            "paper_lh_templates": n_templates, "paper_lh_size": _PAPER_LOGHUB_SIZE[name],
        }
        if name in LOGHUB2:
            pdf2, bank2 = loghub2_lite(name, scale=scale)
            st2 = corpus_stats(pdf2)
            paper_n, paper_t = LOGHUB2[name]
            row.update(
                lh2_logs=st2["n_logs"], lh2_mb=round(st2["size_bytes"] / (1 << 20), 2),
                lh2_templates=st2["n_templates"], lh2_bank=bank2.n_templates,
                paper_lh2_logs=paper_n, paper_lh2_templates=paper_t,
            )
        rows.append(row)
    return rows


def main() -> None:
    from _common import fmt_table

    rows = run()
    header = ["Dataset", "#Logs", "Size", "#Tmpl(bank/seen)", "paper #Tmpl", "paper Size",
              "2.0 #Logs", "2.0 MB", "2.0 #Tmpl(bank/seen)", "paper 2.0 #Logs", "paper 2.0 #Tmpl"]
    body = []
    for r in rows:
        body.append([
            r["dataset"], r["lh_logs"], f"{r['lh_kb']} KB",
            f"{r['lh_bank']}/{r['lh_templates']}", r["paper_lh_templates"], r["paper_lh_size"],
            r.get("lh2_logs", "-"), r.get("lh2_mb", "-"),
            f"{r.get('lh2_bank','-')}/{r.get('lh2_templates','-')}" if "lh2_bank" in r else "-",
            r.get("paper_lh2_logs", "-"), r.get("paper_lh2_templates", "-"),
        ])
    print("Table 1 (reproduction): dataset statistics, ours vs paper")
    print(fmt_table(header, body))


if __name__ == "__main__":
    sys.path.insert(0, __file__.rsplit("/", 1)[0])
    main()
