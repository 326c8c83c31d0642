"""Semantic-domain substrate: vocabularies, column/corpus/benchmark generators.

The paper trains on 250-300K-column web corpora and evaluates on 1200-column
human-labelled benchmarks; none of those assets are available offline, so this
package synthesizes corpora and benchmarks with the same *statistical profile*
(domain mixture, clean/dirty rates, rare-value tiers, error taxonomy). See
DESIGN.md section 2 for the substitution rationale.
"""

from repro.domains.vocab import DOMAINS, DomainSpec, nl_domains, code_domains, mixed_domains

__all__ = [
    "DOMAINS",
    "DomainSpec",
    "nl_domains",
    "code_domains",
    "mixed_domains",
]
