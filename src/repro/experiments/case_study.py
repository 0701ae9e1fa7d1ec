"""Section VII-D case study: Q/A over a hypergraph knowledge base.

The paper queries JF17K (a Freebase subset with non-binary relations,
unavailable offline); we synthesise a typed knowledge hypergraph with
the same two relation kinds and planted answers (DESIGN.md
substitution #6):

- ``(Player, Team, Match)`` facts, with some players playing for
  *different teams in different matches* (Query 1, Fig. 13a);
- ``(Actor, Character, TVShow, Season)`` facts, with some actors
  playing *the same character in the same show across seasons*
  (Query 2, Fig. 13b).

Both queries run through the ordinary HGMatch pipeline; counts are
reported like the paper's (111 and 76 embeddings on real JF17K).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.local_engine import hgmatch
from repro.hyper.model import Hypergraph
from repro.hyper.storage import SignatureStore


def build_knowledge_base(
    *,
    n_players: int = 120,
    n_teams: int = 30,
    n_matches: int = 60,
    n_actors: int = 90,
    n_characters: int = 70,
    n_shows: int = 25,
    n_seasons: int = 8,
    n_play_facts: int = 135,
    n_act_facts: int = 420,
    seed: int = 0,
) -> Hypergraph:
    """Random typed facts; multi-team players and multi-season actor
    stints arise naturally from the random fact generation."""
    g = np.random.default_rng(seed)
    labels: list[str] = []

    def mk(kind: str, n: int) -> list[int]:
        start = len(labels)
        labels.extend([kind] * n)
        return list(range(start, start + n))

    players = mk("Player", n_players)
    teams = mk("Team", n_teams)
    matches = mk("Match", n_matches)
    actors = mk("Actor", n_actors)
    characters = mk("Character", n_characters)
    shows = mk("TVShow", n_shows)
    seasons = mk("Season", n_seasons)

    seen: set[frozenset[int]] = set()
    edges: list[list[int]] = []

    def add(e: list[int]) -> None:
        fe = frozenset(e)
        if fe not in seen:
            seen.add(fe)
            edges.append(e)

    for _ in range(n_play_facts):
        add([int(g.choice(players)), int(g.choice(teams)), int(g.choice(matches))])
    for _ in range(n_act_facts):
        add(
            [
                int(g.choice(actors)),
                int(g.choice(characters)),
                int(g.choice(shows)),
                int(g.choice(seasons)),
            ]
        )
    return Hypergraph(labels, edges)


def query1() -> Hypergraph:
    """Fig. 13a: players who represented different teams in different
    matches — two (Player, Team, Match) hyperedges sharing the player
    only (injectivity forces the teams and matches to differ)."""
    #        0:Player  1:Team 2:Match 3:Team 4:Match
    labels = ["Player", "Team", "Match", "Team", "Match"]
    return Hypergraph(labels, [[0, 1, 2], [0, 3, 4]])


def query2() -> Hypergraph:
    """Fig. 13b: actors who played the same character in a TV show on
    different seasons — two (Actor, Character, TVShow, Season) facts
    sharing the character and the show; injectivity makes the actors
    and seasons differ (paper's example: Pingu's character was played
    by Carlo Bonomi in seasons 1-4 and David Sant in 5-6)."""
    labels = ["Actor", "Character", "TVShow", "Season", "Actor", "Season"]
    return Hypergraph(labels, [[0, 1, 2, 3], [4, 1, 2, 5]])


@dataclass
class CaseStudyResult:
    q1_count: int
    q2_count: int
    paper_q1: int = 111
    paper_q2: int = 76


def run_case_study(*, seed: int = 0) -> CaseStudyResult:
    H = build_knowledge_base(seed=seed)
    store = SignatureStore(H)
    r1 = hgmatch(H, store, query1())
    r2 = hgmatch(H, store, query2())
    return CaseStudyResult(q1_count=r1.count, q2_count=r2.count)
