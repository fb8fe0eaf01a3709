package repro.data

import scala.util.Random
import org.apache.spark.sql.{DataFrame, SparkSession}

/** Synthetic stand-ins for the paper's 16 evaluation datasets (Table 2).
  *
  * The originals are proprietary (KV1–KV5, AliLogs) or large public
  * corpora (Loghub logs, JSON sets, urls/uuid from the FSST repo); each
  * generator reproduces the property PBC and the baselines key on —
  * records drawn from a small family of serialization templates with
  * random field values — with average record lengths close to Table 2.
  * All generators are deterministic in (name, n, seed).
  */
object MachineData {

  /** Dataset names in the paper's Table 2/3/4 order. */
  val all: Vector[String] = Vector(
    "KV1", "KV2", "KV3", "KV4", "KV5",
    "Android", "Apache", "BGL", "HDFS", "Hadoop", "AliLogs",
    "cities", "github", "unece", "urls", "uuid"
  )

  val logDatasets: Vector[String]  = Vector("Android", "Apache", "BGL", "HDFS", "Hadoop", "AliLogs")
  val jsonDatasets: Vector[String] = Vector("cities", "github", "unece")

  /** Default record counts at benchmark scale (paper scale is TBs; ratios
    * depend on structure, not volume — DESIGN.md §5).
    */
  val benchCounts: Map[String, Int] = Map(
    "KV1" -> 50000, "KV2" -> 30000, "KV3" -> 40000, "KV4" -> 50000, "KV5" -> 50000,
    "Android" -> 25000, "Apache" -> 40000, "BGL" -> 20000, "HDFS" -> 25000,
    "Hadoop" -> 12000, "AliLogs" -> 10000,
    "cities" -> 15000, "github" -> 8600, "unece" -> 810,
    "urls" -> 30000, "uuid" -> 30000
  )

  def records(name: String, n: Int, seed: Long = 7L): Vector[String] = {
    val gen: Random => String = name match {
      case "KV1"     => kv1
      case "KV2"     => kv2
      case "KV3"     => kv3
      case "KV4"     => kv4
      case "KV5"     => kv5
      case "Android" => android
      case "Apache"  => apache
      case "BGL"     => bgl
      case "HDFS"    => hdfs
      case "Hadoop"  => hadoop
      case "AliLogs" => aliLogs
      case "cities"  => cities
      case "github"  => github
      case "unece"   => unece
      case "urls"    => urls
      case "uuid"    => uuid
      case other     => throw new IllegalArgumentException(s"unknown dataset: $other")
    }
    val rnd = new Random(seed ^ name.hashCode.toLong)
    Vector.fill(n)(gen(rnd))
  }

  /** Dataset as a single-column Spark DataFrame (`value: STRING`). */
  def df(spark: SparkSession, name: String, n: Int, seed: Long = 7L): DataFrame = {
    import spark.implicits._
    spark.createDataset(records(name, n, seed)).toDF("value")
  }

  // ---- value helpers -------------------------------------------------

  private def digits(r: Random, n: Int): String =
    (1 to n).map(_ => ('0' + r.nextInt(10)).toChar).mkString

  private def digitsNoLead(r: Random, n: Int): String =
    if (n == 1) digits(r, 1)
    else ('1' + r.nextInt(9)).toChar.toString + digits(r, n - 1)

  private def hex(r: Random, n: Int): String =
    (1 to n).map(_ => "0123456789abcdef"(r.nextInt(16))).mkString

  private def lower(r: Random, n: Int): String =
    (1 to n).map(_ => ('a' + r.nextInt(26)).toChar).mkString

  private def ts(r: Random): String = (1600000000 + r.nextInt(100000000)).toString

  private def price(r: Random): String = s"${1 + r.nextInt(999)}.${digits(r, 2)}"

  private def pad2(v: Int): String = f"$v%02d"

  private def choose[A](r: Random, xs: IndexedSeq[A]): A = xs(r.nextInt(xs.length))

  // ---- KV workloads --------------------------------------------------

  private val tickers = Vector("IBM", "AAPL", "GOOG", "MSFT", "AMZN", "BABA", "TSLA", "NVDA",
    "META", "ORCL", "INTC", "AMD", "CRM", "NFLX", "UBER", "SHOP")

  /** KV1 — trade records, the paper's introductory example (avg ~72). */
  private def kv1(r: Random): String =
    if (r.nextInt(10) < 7)
      s"""{"symbol": "${choose(r, tickers)}", "side": "${choose(r, Vector("B", "S"))}", "quantity": ${digitsNoLead(r, 1 + r.nextInt(3))}, "price": ${price(r)}, "timestamp": ${ts(r)}}"""
    else
      s"""{"acct": "${digits(r, 10)}", "op": "${choose(r, Vector("PAY", "RFD"))}", "amt": ${price(r)}}"""

  private val userAgents = Vector(
    "Mozilla/5.0 (iPhone; CPU iPhone OS 14_6 like Mac OS X) AppleWebKit/605.1.15",
    "Mozilla/5.0 (Linux; Android 11; SM-G991B) AppleWebKit/537.36",
    "Mozilla/5.0 (Windows NT 10.0; Win64; x64) AppleWebKit/537.36 Chrome/96.0",
    "AlipayClient/10.2.38.6100 (Android 10)"
  )

  /** KV2 — session blobs, URL-encoded params (avg ~159). */
  private def kv2(r: Random): String =
    s"uid=${digitsNoLead(r, 8)}&sess=${hex(r, 32)}&ip=10.${r.nextInt(256)}.${r.nextInt(256)}.${r.nextInt(256)}" +
      s"&ua=${choose(r, userAgents)}&ts=${ts(r)}&flags=${hex(r, 4)}&rt=${r.nextInt(500)}"

  /** KV3 — CSV metric rows (avg ~91). */
  private def kv3(r: Random): String = {
    val host = s"host-${digits(r, 4)}.dc${1 + r.nextInt(4)}.prod.example.com"
    val metric = choose(r, Vector("cpu.util", "mem.rss", "disk.io.read", "net.tx.bytes"))
    s"$host,$metric,2021-12-${pad2(1 + r.nextInt(28))}T${pad2(r.nextInt(24))}:${pad2(r.nextInt(60))}:${pad2(r.nextInt(60))}Z,0.${digits(r, 4)},${choose(r, Vector("OK", "WARN", "CRIT"))}"
  }

  /** KV4 — short pipe-separated tuples (avg ~44). */
  private def kv4(r: Random): String =
    s"u:${digits(r, 8)}|b:${price(r)}|t:${ts(r)}|s:${r.nextInt(4)}"

  /** KV5 — hash-separated cart items (avg ~53). */
  private def kv5(r: Random): String =
    s"ITEM#${digits(r, 6)}#CART#2021${pad2(1 + r.nextInt(12))}${pad2(1 + r.nextInt(28))}#qty=${1 + r.nextInt(9)}#px=${price(r)}"

  // ---- Logs (Loghub-shaped templates) ---------------------------------

  private def androidTime(r: Random): String =
    s"03-${17 + r.nextInt(3)} ${pad2(r.nextInt(24))}:${pad2(r.nextInt(60))}:${pad2(r.nextInt(60))}.${digits(r, 3)}"

  private def android(r: Random): String = {
    val t = androidTime(r)
    val pid = 1000 + r.nextInt(9000)
    val tid = 1000 + r.nextInt(9000)
    r.nextInt(4) match {
      case 0 => s"$t  $pid  $tid D PowerManagerService: release:lock=${digits(r, 9)}, flg=0x0, tag=\"RILJ_ACK_WL\", name=com.android.phone, ws=null, uid=1001, pid=${digits(r, 4)}"
      case 1 => s"$t  $pid  $tid I ActivityManager: Start proc ${digits(r, 5)}:com.tencent.mm/u0a${digits(r, 2)} for service com.tencent.mm/.plugin.AppService"
      case 2 => s"$t  $pid  $tid W AlarmManager: Unrecognized alarm listener com.android.server.job.JobSchedulerService\\$$${hex(r, 7)}"
      case _ => s"$t  $pid  $tid V WindowManager: Relayout Window{${hex(r, 7)} u0 StatusBar}: viewVisibility=0 req=1080x${digits(r, 4)}"
    }
  }

  private val apacheDays = Vector("Mon", "Tue", "Wed", "Thu", "Fri", "Sat", "Sun")
  private def apache(r: Random): String = {
    val t = s"[${choose(r, apacheDays)} Dec ${pad2(1 + r.nextInt(28))} ${pad2(r.nextInt(24))}:${pad2(r.nextInt(60))}:${pad2(r.nextInt(60))} 2005]"
    r.nextInt(3) match {
      case 0 => s"$t [error] mod_jk child workerEnv in error state ${r.nextInt(9)}"
      case 1 => s"$t [error] [client 64.${r.nextInt(256)}.${r.nextInt(256)}.${r.nextInt(256)}] Directory index forbidden by rule: /var/www/html/"
      case _ => s"$t [notice] jk2_init() Found child ${digits(r, 4)} in scoreboard slot ${r.nextInt(12)}"
    }
  }

  private def bgl(r: Random): String = {
    val node = s"R${pad2(r.nextInt(32))}-M${r.nextInt(2)}-N${r.nextInt(16)}-C:J${pad2(r.nextInt(18))}-U${pad2(1 + r.nextInt(11))}"
    val epoch = 1117838570 + r.nextInt(1000000)
    val stamp = s"2005-06-${pad2(1 + r.nextInt(28))}-${pad2(r.nextInt(24))}.${pad2(r.nextInt(60))}.${pad2(r.nextInt(60))}.${digits(r, 6)}"
    r.nextInt(3) match {
      case 0 => s"- $epoch 2005.06.03 $node $stamp $node RAS KERNEL INFO instruction cache parity error corrected"
      case 1 => s"- $epoch 2005.06.03 $node $stamp $node RAS KERNEL INFO ${digits(r, 8)} double-hummer alignment exceptions"
      case _ => s"- $epoch 2005.06.03 $node $stamp $node RAS KERNEL FATAL data TLB error interrupt"
    }
  }

  private def hdfs(r: Random): String = {
    val t = s"0811${pad2(1 + r.nextInt(28))} ${digits(r, 6)} ${digits(r, 3)}"
    val blk = s"blk_${if (r.nextBoolean()) "-" else ""}${digitsNoLead(r, 17)}"
    r.nextInt(3) match {
      case 0 => s"$t INFO dfs.DataNode$$PacketResponder: PacketResponder ${r.nextInt(3)} for block $blk terminating"
      case 1 => s"$t INFO dfs.FSNamesystem: BLOCK* NameSystem.addStoredBlock: blockMap updated: 10.251.${r.nextInt(256)}.${r.nextInt(256)}:50010 is added to $blk size ${digitsNoLead(r, 7)}"
      case _ => s"$t INFO dfs.DataNode$$DataXceiver: Receiving block $blk src: /10.251.${r.nextInt(256)}.${r.nextInt(256)}:${30000 + r.nextInt(30000)} dest: /10.251.${r.nextInt(256)}.${r.nextInt(256)}:50010"
    }
  }

  private def hadoop(r: Random): String = {
    val t = s"2015-10-${pad2(1 + r.nextInt(28))} ${pad2(r.nextInt(24))}:${pad2(r.nextInt(60))}:${pad2(r.nextInt(60))},${digits(r, 3)}"
    val app = s"application_${digits(r, 13)}_${pad2(r.nextInt(100))}"
    r.nextInt(3) match {
      case 0 => s"$t INFO [main] org.apache.hadoop.mapreduce.v2.app.MRAppMaster: Created MRAppMaster for application appattempt_${digits(r, 13)}_${pad2(r.nextInt(100))}_${digits(r, 6)} with exit code 0; cleanup of staging dir /tmp/hadoop-yarn/staging/msrabi/.staging/job_${digits(r, 13)}_${pad2(r.nextInt(100))} completed successfully"
      case 1 => s"$t INFO [RMCommunicator Allocator] org.apache.hadoop.mapreduce.v2.app.rm.RMContainerAllocator: Recalculating schedule, headroom=<memory:${digitsNoLead(r, 4)}, vCores:${r.nextInt(32)}> knownNMs=${r.nextInt(8)} assignedMaps=${r.nextInt(20)} assignedReduces=0 completedMaps=${r.nextInt(20)} scheduledReduces=0"
      case _ => s"$t INFO [AsyncDispatcher event handler] org.apache.hadoop.mapreduce.v2.app.job.impl.TaskAttemptImpl: attempt_${digits(r, 13)}_${pad2(r.nextInt(100))}_m_${digits(r, 6)}_${r.nextInt(3)} TaskAttempt Transitioned from RUNNING to SUCCESS_CONTAINER_CLEANUP for $app"
    }
  }

  private def aliLogs(r: Random): String = {
    val trace = hex(r, 32)
    val rpc = s"0.${digits(r, 1)}.${digits(r, 2)}"
    s"2021-12-${pad2(1 + r.nextInt(28))} ${pad2(r.nextInt(24))}:${pad2(r.nextInt(60))}:${pad2(r.nextInt(60))}.${digits(r, 3)}|$trace|$rpc|com.alipay.sofa.rpc.registry.RegistryService|lookupProviders|DEFAULT|${digits(r, 4)}ms|SUCCESS|biz=trade-center,idc=eu95,zone=GZ00B,ldc=CZ00A,pressure=F,gray=false|remote=11.${r.nextInt(256)}.${r.nextInt(256)}.${r.nextInt(256)}:12200|protocol=bolt|serializer=hessian2|payload=${digitsNoLead(r, 4)}B|queue=${r.nextInt(100)}us|elapsed=${digitsNoLead(r, 3)}us"
  }

  // ---- JSON -----------------------------------------------------------

  private val countryCodes = Vector("US", "CN", "DE", "FR", "JP", "BR", "IN", "GB", "IT", "AU", "ES", "NL")
  private val tzs = Vector("America/New_York", "Europe/Berlin", "Asia/Shanghai", "Asia/Tokyo",
    "Europe/Paris", "America/Sao_Paulo", "Australia/Sydney", "Europe/Madrid")

  private def cities(r: Random): String = {
    val name = lower(r, 4 + r.nextInt(8)).capitalize
    s"""{"name":"$name","country":"${choose(r, countryCodes)}","admin1":"${lower(r, 2).toUpperCase}","lat":${r.nextInt(180) - 90}.${digits(r, 5)},"lng":${r.nextInt(360) - 180}.${digits(r, 5)},"population":${digitsNoLead(r, 3 + r.nextInt(5))},"elevation":${r.nextInt(4000)},"timezone":"${choose(r, tzs)}","modified":"2021-${pad2(1 + r.nextInt(12))}-${pad2(1 + r.nextInt(28))}"}"""
  }

  /** github — user objects as in Zstd's test corpus: every URL is derived
    * from the login, a heavily templated structure (avg ~864).
    */
  private def github(r: Random): String = {
    val login = lower(r, 5 + r.nextInt(8))
    val id = digitsNoLead(r, 5 + r.nextInt(3))
    s"""{"login":"$login","id":$id,"node_id":"MDQ6VXNlcj${hex(r, 8)}=","avatar_url":"https://avatars.githubusercontent.com/u/$id?v=4","gravatar_id":"","url":"https://api.github.com/users/$login","html_url":"https://github.com/$login","followers_url":"https://api.github.com/users/$login/followers","following_url":"https://api.github.com/users/$login/following{/other_user}","gists_url":"https://api.github.com/users/$login/gists{/gist_id}","starred_url":"https://api.github.com/users/$login/starred{/owner}{/repo}","subscriptions_url":"https://api.github.com/users/$login/subscriptions","organizations_url":"https://api.github.com/users/$login/orgs","repos_url":"https://api.github.com/users/$login/repos","events_url":"https://api.github.com/users/$login/events{/privacy}","received_events_url":"https://api.github.com/users/$login/received_events","type":"User","site_admin":${r.nextBoolean()}}"""
  }

  /** unece — wide country-statistics objects (avg ~4495). */
  private def unece(r: Random): String = {
    val c = choose(r, countryCodes)
    val name = lower(r, 6 + r.nextInt(10)).capitalize
    val yearStats = (1990 to 2020).map { y =>
      s""""$y":{"population":${digitsNoLead(r, 7)},"gdp_per_capita":${digitsNoLead(r, 5)}.${digits(r, 2)},"life_expectancy":${60 + r.nextInt(25)}.${digits(r, 1)},"unemployment_rate":${r.nextInt(25)}.${digits(r, 1)},"co2_emissions":${digitsNoLead(r, 4)}.${digits(r, 2)},"energy_use":${digitsNoLead(r, 4)},"exports_usd":${digitsNoLead(r, 9)},"imports_usd":${digitsNoLead(r, 9)}}"""
    }.mkString(",")
    s"""{"country":"$name","iso":"$c","region":"${choose(r, Vector("Europe", "Asia", "Americas", "Oceania"))}","capital":"${lower(r, 5 + r.nextInt(7)).capitalize}","area_km2":${digitsNoLead(r, 6)},"currency":"${lower(r, 3).toUpperCase}","statistics":{$yearStats}}"""
  }

  // ---- boundary datasets ----------------------------------------------

  private val domains = Vector("www.google.com", "en.wikipedia.org", "www.amazon.com",
    "github.com", "stackoverflow.com", "news.ycombinator.com", "www.reddit.com", "medium.com")
  private val urlPaths = Vector("wiki", "search", "item", "articles", "questions", "r", "p", "dp")

  private def urls(r: Random): String =
    s"http://${choose(r, domains)}/${choose(r, urlPaths)}/${lower(r, 3 + r.nextInt(12))}?id=${digitsNoLead(r, 2 + r.nextInt(6))}&ref=${lower(r, 4)}"

  /** uuid — time-based (v1-style) UUIDs as produced by one machine: the
    * node id and clock sequence are constant and the high time bits move
    * slowly, like the FSST-repo corpus the paper curates (fully random
    * v4 UUIDs would carry no shared structure at all, which is not what
    * that corpus looks like; the varying time fields still make this the
    * paper's randomness control).
    */
  private def uuid(r: Random): String = {
    val timeLow = hex(r, 8)
    val timeMid = hex(r, 4)
    val timeHi = "1" + hex(r, 3)
    s"$timeLow-$timeMid-$timeHi-9f2c-58e3a1c94b02"
  }
}
