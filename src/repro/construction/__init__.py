"""KG construction pipelines (paper Sec. II-B / II-C).

- :mod:`repro.construction.trie` / :mod:`repro.construction.schema_mapping`
  — Brand/Place linking via trie precise matching + fuzzy synonym
  matching, distributed with mapInPandas;
- :mod:`repro.construction.tagger` / :mod:`repro.construction.concepts`
  — bottom-up concept extraction (BERT-CRF substitute) over titles and
  reviews;
- :mod:`repro.construction.facets` — plausibility / typicality /
  remarkability / salience scoring of concept statements;
- :mod:`repro.construction.category` — top-down Category quality review;
- :mod:`repro.construction.assemble` — full OpenBG triple assembly;
- :mod:`repro.construction.stats` — Table I statistics queries.
"""
