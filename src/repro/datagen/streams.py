"""Synthetic streaming graphs standing in for the paper's three datasets.

Every generator returns a pandas DataFrame with the canonical stream
columns ``(eid, ts, src, dst, slabel, dlabel, elabel)``, timestamps
strictly increasing (ts = 1..n, i.e. one "average inter-arrival unit"
per edge — the paper's window-size unit), deterministic in ``seed``.

* ``netflow_stream``  — CAIDA-like IP traffic: all vertices labelled
  "IP", edge label = "*|dport|proto" (source port wildcarded, as §VII-A
  does), Zipf destination ports so a handful of ports dominate, Zipf
  endpoint popularity.
* ``wikitalk_stream`` — SNAP wiki-talk-like: vertex label = first letter
  of the user name (Zipf over letters), heavy-tailed edit activity.
* ``social_stream``   — LSBench-like social stream: typed entities
  (user/post/photo/gps) and predicate-labelled interactions.
* ``attack_trace``    — netflow background plus planted Fig 1
  information-exfiltration patterns (the §VII-F case study).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

EDGE_COLS = ["eid", "ts", "src", "dst", "slabel", "dlabel", "elabel"]


def _zipf_choice(rng: np.random.Generator, n: int, size: int, alpha: float) -> np.ndarray:
    ranks = np.arange(1, n + 1)
    w = 1.0 / ranks**alpha
    w /= w.sum()
    return rng.choice(n, size=size, p=w)


def _frame(src, dst, slabel, dlabel, elabel) -> pd.DataFrame:
    n = len(src)
    return pd.DataFrame(
        {
            "eid": np.arange(n, dtype=np.int64),
            "ts": np.arange(1, n + 1, dtype=np.int64),
            "src": np.asarray(src, dtype=np.int64),
            "dst": np.asarray(dst, dtype=np.int64),
            "slabel": slabel,
            "dlabel": dlabel,
            "elabel": elabel,
        }
    )[EDGE_COLS]


def netflow_stream(
    n_edges: int,
    *,
    n_ips: int = 200,
    n_ports: int = 200,
    n_protos: int = 3,
    seed: int = 0,
) -> pd.DataFrame:
    """CAIDA-like traffic. Zipf(1.2) ports ⇒ the top ~6 ports carry ~half the
    edges while the long tail is highly selective — the §VII-A property."""
    rng = np.random.default_rng(seed)
    src = _zipf_choice(rng, n_ips, n_edges, 1.1)
    dst = _zipf_choice(rng, n_ips, n_edges, 1.1)
    # no self-communication
    same = src == dst
    dst[same] = (dst[same] + 1 + rng.integers(0, n_ips - 1, same.sum())) % n_ips
    ports = _zipf_choice(rng, n_ports, n_edges, 1.2)
    protos = rng.choice(["tcp", "udp", "icmp"][:n_protos], n_edges, p=None)
    elabel = pd.Series([f"*|{p}|{pr}" for p, pr in zip(ports, protos)])
    return _frame(src, dst, "IP", "IP", elabel)


def wikitalk_stream(
    n_edges: int, *, n_users: int = 300, seed: int = 1
) -> pd.DataFrame:
    """Wiki-talk-like edit stream; vertex label = first letter of the name."""
    rng = np.random.default_rng(seed)
    letters = np.array(list("abcdefghijklmnopqrstuvwxyz"))
    user_letter = letters[_zipf_choice(rng, 26, n_users, 1.0)]
    src = _zipf_choice(rng, n_users, n_edges, 1.05)
    dst = _zipf_choice(rng, n_users, n_edges, 1.05)
    same = src == dst
    dst[same] = (dst[same] + 1 + rng.integers(0, n_users - 1, same.sum())) % n_users
    return _frame(
        src, dst, pd.Series(user_letter[src]), pd.Series(user_letter[dst]), "talk"
    )


def social_stream(
    n_edges: int, *, n_users: int = 150, seed: int = 2
) -> pd.DataFrame:
    """LSBench-like typed social stream (users post/like/reply/upload/track)."""
    rng = np.random.default_rng(seed)
    # id ranges per type keep vertex labels consistent
    post_base, photo_base, gps_base = 10_000, 20_000, 30_000
    posts: list[int] = []
    photos: list[int] = []
    rows = {c: [] for c in ("src", "dst", "slabel", "dlabel", "elabel")}

    def emit(s, d, sl, dl, el):
        rows["src"].append(s)
        rows["dst"].append(d)
        rows["slabel"].append(sl)
        rows["dlabel"].append(dl)
        rows["elabel"].append(el)

    kinds = rng.choice(
        ["post", "like", "reply", "upload", "tag", "gps", "follow"],
        n_edges,
        p=[0.22, 0.26, 0.12, 0.10, 0.08, 0.12, 0.10],
    )
    for kind in kinds:
        u = int(_zipf_choice(rng, n_users, 1, 1.05)[0])
        if kind == "post" or (kind in ("like", "reply", "tag") and not posts):
            p = post_base + len(posts)
            posts.append(p)
            emit(u, p, "user", "post", "creates")
        elif kind == "like":
            emit(u, int(posts[rng.integers(len(posts))]), "user", "post", "likes")
        elif kind == "reply":
            p = post_base + len(posts)
            target = int(posts[rng.integers(len(posts))])
            posts.append(p)
            emit(p, target, "post", "post", "replyOf")
        elif kind == "upload" or (kind == "tag" and not photos):
            f = photo_base + len(photos)
            photos.append(f)
            emit(u, f, "user", "photo", "uploads")
        elif kind == "tag":
            emit(
                int(posts[rng.integers(len(posts))]),
                int(photos[rng.integers(len(photos))]),
                "post",
                "photo",
                "tags",
            )
        elif kind == "gps":
            emit(u, gps_base + int(rng.integers(0, 50)), "user", "gps", "at")
        else:  # follow
            v = int(_zipf_choice(rng, n_users, 1, 1.05)[0])
            if v == u:
                v = (v + 1) % n_users
            emit(u, v, "user", "user", "follows")
    return _frame(
        rows["src"], rows["dst"], pd.Series(rows["slabel"]),
        pd.Series(rows["dlabel"]), pd.Series(rows["elabel"]),
    )


DATASETS = {
    "netflow": netflow_stream,
    "wikitalk": wikitalk_stream,
    "social": social_stream,
}


# --------------------------------------------------------------------- #
# Case study (§VII-F): Fig 1 exfiltration pattern planted in traffic
# --------------------------------------------------------------------- #
ATTACK_STEPS = ["browse", "malware", "register", "command", "exfiltrate"]


def attack_query():
    """The Fig 1 query: five edges with the full timing order t1<…<t5."""
    from ..core.query import QueryGraph, full_order_from_sequence

    # vertices: 0=victim, 1=website, 2=C&C server — all label "IP"
    edges = [
        (0, 1, "browse"),      # t1: victim browses compromised website
        (1, 0, "malware"),     # t2: malware scripts downloaded
        (0, 2, "register"),    # t3: victim registers at C&C
        (2, 0, "command"),     # t4: C&C sends command
        (0, 2, "exfiltrate"),  # t5: data exfiltrated to C&C
    ]
    return QueryGraph(
        {0: "IP", 1: "IP", 2: "IP"},
        edges,
        full_order_from_sequence(range(5)),
    )


def attack_trace(
    n_edges: int = 2000,
    *,
    n_attacks: int = 1,
    n_ips: int = 150,
    attack_span: int = 20,
    seed: int = 7,
) -> pd.DataFrame:
    """Background netflow with ``n_attacks`` planted Fig 1 attack chains.

    Attack edges reuse the step names as edge labels; background traffic
    also emits those labels at random (so detection must match the
    *pattern*, not just a label), but the full 5-step chain with correct
    direction + timing occurs exactly where planted.
    """
    rng = np.random.default_rng(seed)
    base = netflow_stream(n_edges, n_ips=n_ips, seed=seed)
    # Sprinkle attack-step labels into background noise (~10% of edges).
    noisy = rng.random(n_edges) < 0.10
    base.loc[noisy, "elabel"] = rng.choice(ATTACK_STEPS, int(noisy.sum()))
    for a in range(n_attacks):
        victim, website, cnc = (
            n_ips + 3 * a,
            n_ips + 3 * a + 1,
            n_ips + 3 * a + 2,
        )
        # non-overlapping deterministic spans so multiple attacks never
        # overwrite each other's planted edges
        start = (a + 1) * (n_edges - attack_span) // (n_attacks + 1)
        slots = sorted(
            rng.choice(np.arange(start, start + attack_span), 5, replace=False)
        )
        chain = [
            (victim, website, "browse"),
            (website, victim, "malware"),
            (victim, cnc, "register"),
            (cnc, victim, "command"),
            (victim, cnc, "exfiltrate"),
        ]
        for slot, (s, d, el) in zip(slots, chain):
            base.loc[slot, ["src", "dst", "elabel"]] = [s, d, el]
    base["slabel"] = "IP"
    base["dlabel"] = "IP"
    return base
