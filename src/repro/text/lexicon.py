"""Small English lexicons used by the NLP preprocessing pipeline.

The paper's pipeline (§3, "Documents Format Transformation") runs
tokenization, stopword removal, part-of-speech filtering (keep nouns),
and lemmatization. We have no POS tagger offline, so the POS filter is a
lexicon heuristic: a token is treated as noun-like unless it appears in
the stopword list or in the function-word list below (common verbs,
adjectives, adverbs, auxiliaries). Unknown tokens — which include every
domain entity term — pass through, which matches the recall-oriented
behaviour a real noun filter has on domain vocabulary.
"""
from __future__ import annotations

STOPWORDS: frozenset[str] = frozenset(
    """a about above after again against all am an and any are aren as at be
    because been before being below between both but by cannot could couldn
    did didn do does doesn doing don down during each few for from further had
    hadn has hasn have haven having he her here hers herself him himself his
    how i if in into is isn it its itself let me more most mustn my myself no
    nor not of off on once only or other ought our ours ourselves out over own
    same shan she should shouldn so some such than that the their theirs them
    themselves then there these they this those through to too under until up
    very was wasn we were weren what when where which while who whom why with
    won would wouldn you your yours yourself yourselves""".split()
)

# Common verbs / adjectives / adverbs dropped by the noun-filter heuristic.
FUNCTION_WORDS: frozenset[str] = frozenset(
    """show shows showed shown suggest suggests suggested indicate indicates
    indicated increase increases increased decrease decreases decreased
    observe observes observed report reports reported find finds found
    perform performs performed measure measures measured use uses used
    describe describes described reveal reveals revealed confirm confirms
    confirmed evaluate evaluates evaluated compare compares compared
    significant significantly novel various several recent recently highly
    strongly weakly likely unlikely important relevant related associated
    known unknown common rare large small high low new old good bad strong
    weak early late many much also however therefore moreover furthermore
    respectively approximately study studies present presented obtain
    obtained result results resulting include includes including contain
    contains containing provide provides provided""".split()
)


def is_function_word(token: str) -> bool:
    """True if ``token`` is a stopword or a known non-noun function word."""
    return token in STOPWORDS or token in FUNCTION_WORDS
