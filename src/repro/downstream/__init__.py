"""KG-enhanced downstream tasks (paper Sec. IV, Tables V–VII).

Each module builds a synthetic dataset from the world, fine-tunes every
foundation-model variant's task head, and reports the paper's metric:

- :mod:`category_pred` — category prediction (accuracy; Tables V, VI)
- :mod:`ner_titles`    — NER for titles (span P/R/F; Tables V, VII)
- :mod:`summarization` — title summarization (ROUGE-L; Table V)
- :mod:`ie_reviews`    — IE for reviews (triple P/R/F; Table V)
- :mod:`salience`      — salience evaluation (accuracy; Table V)
"""
