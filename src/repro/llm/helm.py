"""Synthetic 16-task HELM-core-like benchmark (paper Tables 2 & 9).

Each of the paper's 16 HELM core tasks maps to a domain + format:
eval documents are *pristine* in-domain text (the thing pre-training is
supposed to model), and instruction-formatted tasks wrap them in the
Alpaca prompt template so IFT-continued models gain exactly where the
paper's do (NarrativeQA, RAFT, CNN/DailyMail... improve with IFT in
Table 9). A model's task score is ``score_from_ppl(perplexity)``; the
benchmark average is the Table 2 "Score".
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core import schema
from repro.corpus.text_gen import clean_eval_texts
from repro.corpus.posttuning import format_example
from repro.llm.bigram import (
    BigramModel,
    perplexity,
    perplexity_by_group,
    score_from_ppl,
)


@dataclass(frozen=True)
class TaskSpec:
    name: str
    domain: str
    instruct: bool  # instruction-formatted (IFT-sensitive) task


#: The 16 HELM core tasks of Table 9, mapped to our domains. ``instruct``
#: mirrors which tasks gained most from IFT continuation in Table 9.
TASKS: tuple[TaskSpec, ...] = (
    TaskSpec("MMLU", "wiki", False),
    TaskSpec("BoolQ", "wiki", False),
    TaskSpec("NarrativeQA", "books", True),
    TaskSpec("NaturalQuestions (closed-book)", "wiki", False),
    TaskSpec("NaturalQuestions (open-book)", "wiki", True),
    TaskSpec("QuAC", "dialog", False),
    TaskSpec("HellaSwag", "web", False),
    TaskSpec("OpenbookQA", "wiki", True),
    TaskSpec("TruthfulQA", "web", True),
    TaskSpec("MS MARCO (regular)", "web", False),
    TaskSpec("MS MARCO (TREC)", "web", False),
    TaskSpec("IMDB", "books", False),
    TaskSpec("XSUM", "web", True),
    TaskSpec("CNN/DailyMail", "web", True),
    TaskSpec("CivilComments", "dialog", False),
    TaskSpec("RAFT", "instruction", True),
)

_N_EVAL_DOCS = 24


def task_eval_set(spark: SparkSession, task: TaskSpec, seed: int = 3000) -> DataFrame:
    """The eval documents of one task as a unified dataset."""
    texts = clean_eval_texts(
        task.domain, _N_EVAL_DOCS, seed=seed + hash(task.name) % 1000,
        mean_tokens=100,
    )
    if task.instruct:
        texts = [
            format_example(f"Answer the following {task.domain} question", t)
            for t in texts
        ]
    return schema.from_texts(
        spark, texts, metas=[{"task": task.name}] * len(texts)
    )


def full_eval_set(spark: SparkSession, tasks: tuple[TaskSpec, ...] = TASKS,
                  seed: int = 3000) -> DataFrame:
    """All tasks' eval docs in one unified dataset (meta.task labels)."""
    dfs = [task_eval_set(spark, t, seed) for t in tasks]
    out = dfs[0]
    for d in dfs[1:]:
        out = out.unionByName(d)
    return out


def evaluate(spark: SparkSession, model: BigramModel,
             tasks: tuple[TaskSpec, ...] = TASKS, seed: int = 3000,
             eval_df: DataFrame | None = None) -> dict[str, float]:
    """Per-task scores for one model (single grouped Spark job).

    Pass a cached ``eval_df`` from :func:`full_eval_set` when scoring
    several models to avoid regenerating the eval documents.
    """
    if eval_df is None:
        eval_df = full_eval_set(spark, tasks, seed)
    ppls = perplexity_by_group(model, eval_df, "task")
    return {t.name: round(score_from_ppl(ppls.get(t.name, float("inf"))), 2)
            for t in tasks}


def average_score(scores: dict[str, float]) -> float:
    """The Table 2 "Score": plain mean over the 16 tasks."""
    return round(sum(scores.values()) / len(scores), 2)


def leaderboard(model_scores: dict[str, dict[str, float]]) -> pd.DataFrame:
    """Tasks × models table (Table 9 layout) with an average row."""
    df = pd.DataFrame(model_scores)
    df.loc["Average"] = df.mean()
    return df.round(2)
